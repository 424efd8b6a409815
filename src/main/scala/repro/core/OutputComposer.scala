package repro.core

import java.nio.charset.StandardCharsets
import java.nio.file.{Files, Paths}

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** A contiguous run of matching frames of one scene — a "video snippet"
  * in the paper's saveVideos output.
  */
final case class Snippet(sceneId: Long, startFrame: Int, endFrame: Int) {
  def nFrames: Int = endFrame - startFrame + 1
}

/** Output Composer (§5.2.4): formats query-engine results for observation.
  * There are no pixels in this reproduction, so saveVideos emits snippet
  * manifests (scene + frame ranges, i.e. exactly what would be encoded)
  * instead of encoded video files — see DESIGN.md §2.
  */
object OutputComposer {

  /** Distinct matching frames merged into snippets; gaps of up to
    * `mergeGap` frames are bridged so a briefly-lost object stays in one
    * snippet.
    */
  def snippets(resultRows: DataFrame, mergeGap: Int = 12): Seq[Snippet] = {
    val frames = resultRows.select(col("sceneId"), col("frameIdx"))
      .distinct()
      .collect()
      .map(r => (r.getLong(0), r.getInt(1)))
      .groupBy(_._1)
      .view.mapValues(_.map(_._2).sorted.toVector)
      .toMap

    frames.toSeq.sortBy(_._1).flatMap { case (sid, fs) =>
      val out = Vector.newBuilder[Snippet]
      var start = fs.head
      var prev  = fs.head
      fs.tail.foreach { f =>
        if (f - prev > mergeGap + 1) {
          out += Snippet(sid, start, prev)
          start = f
        }
        prev = f
      }
      out += Snippet(sid, start, prev)
      out.result()
    }
  }

  /** Write the snippet manifest as JSON lines; returns the snippets. */
  def saveVideos(resultRows: DataFrame, path: String, mergeGap: Int = 12): Seq[Snippet] = {
    val snips = snippets(resultRows, mergeGap)
    val lines = snips.map { s =>
      s"""{"sceneId": ${s.sceneId}, "startFrame": ${s.startFrame}, "endFrame": ${s.endFrame}}"""
    }
    val p = Paths.get(path)
    if (p.getParent != null) Files.createDirectories(p.getParent)
    Files.write(p, lines.mkString("\n").getBytes(StandardCharsets.UTF_8))
    snips
  }

  /** The matched Movable Objects themselves (getObjects): their full
    * per-frame samples, restricted to the matched object ids.
    */
  def getObjects(resultRows: DataFrame, objs: DataFrame): DataFrame = {
    val oidCols = resultRows.columns.filter(_.endsWith("_oid"))
    if (oidCols.isEmpty) return objs.limit(0)
    val matchedOids = oidCols.map { c =>
      resultRows.select(col("sceneId"), col(c).as("oid"))
    }.reduce(_ union _).distinct()
    objs.join(matchedOids, Seq("sceneId", "oid"))
  }
}
