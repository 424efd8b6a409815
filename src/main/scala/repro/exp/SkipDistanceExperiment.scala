package repro.exp

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions.col
import repro.core.ExitFrameSampler
import repro.track.{Metrics, SortTracker, TrackedRow}
import repro.video.{CostModel, Estimators, SimDetector}

/** One skip-distance bucket of the §6.4.3 study (Fig. 4c). */
final case class SkipRow(skip: Int, gaps: Long, f1: Double, runtimeRatio: Double)

/** §6.4.3: run the Exit Frame Sampler with a large skip cap over the
  * vehicle detections, then for every sampled gap compare (a) tracking
  * continuity against the no-sampler baseline (F1) and (b) the modelled
  * tracker+sampler runtime against tracking every in-between frame.
  */
object SkipDistanceExperiment {

  def run(spark: SparkSession, ds: Dataset, maxSkip: Int = 20): Seq[SkipRow] = {
    import spark.implicits._

    val dets   = SimDetector.detect(spark, ds.frames, ds.gtStates)
    val cars   = dets.filter(col("otype").isin("car", "truck")).persist()
    val dets3d = Estimators.geometry(spark, cars).persist()

    val sampled = ExitFrameSampler.sample(spark, ds.frames, dets3d, ds.net, ds.fps, maxSkip)

    val tracker  = new SortTracker()
    val gtTracks = tracker.track(spark, dets3d)
    val prTracks = tracker.track(spark, dets3d.join(sampled, Seq("sceneId", "frameIdx")))

    def byScene(rows: Seq[TrackedRow]): Map[Long, Map[Int, Map[Long, Long]]] =
      rows.groupBy(_.sceneId).view.mapValues {
        _.groupBy(_.frameIdx).view.mapValues(_.map(r => r.oid -> r.trackId).toMap).toMap
      }.toMap

    val gtByScene = byScene(gtTracks.as[TrackedRow].collect().toSeq)
    val prByScene = byScene(prTracks.as[TrackedRow].collect().toSeq)
    val sampledByScene = sampled.as[repro.core.SampledFrame].collect()
      .groupBy(_.sceneId).view.mapValues(_.map(_.frameIdx).sorted.toSeq).toMap
    val detCounts = dets3d.groupBy("sceneId", "frameIdx").count().collect()
      .map(r => (r.getLong(0), r.getInt(1)) -> r.getLong(2)).toMap

    final case class Acc(var tp: Long = 0, var fp: Long = 0, var fn: Long = 0,
                         var gaps: Long = 0, var withMs: Double = 0, var withoutMs: Double = 0)
    val acc = scala.collection.mutable.Map.empty[Int, Acc]

    sampledByScene.foreach { case (sid, frames) =>
      val gt = gtByScene.getOrElse(sid, Map.empty)
      val pr = prByScene.getOrElse(sid, Map.empty)
      Metrics.gapOutcomes(gt, pr, frames).foreach { case (skip, tp, fp, fn) =>
        val a = acc.getOrElseUpdate(skip, Acc())
        a.tp += tp; a.fp += fp; a.fn += fn; a.gaps += 1
      }
      def trackCostMs(f: Int): Double = {
        val n = detCounts.getOrElse((sid, f), 0L).toDouble
        CostModel.TrackerFrameMs + CostModel.TrackerDetMs * n + CostModel.TrackerPairMs * n * n
      }
      frames.sorted.sliding(2).foreach {
        case Seq(f0, f1) if f1 > f0 =>
          val skip = f1 - f0 - 1
          val a    = acc.getOrElseUpdate(skip, Acc())
          a.withMs += CostModel.EfsPerFrameMs * (f1 - f0) + trackCostMs(f1)
          a.withoutMs += (f0 + 1 to f1).map(trackCostMs).sum
        case _ =>
      }
    }

    acc.toSeq.sortBy(_._1).map { case (skip, a) =>
      val f1 = if (2 * a.tp + a.fp + a.fn == 0) 1.0 else 2.0 * a.tp / (2.0 * a.tp + a.fp + a.fn)
      SkipRow(skip, a.gaps, f1, if (a.withoutMs > 0) a.withMs / a.withoutMs else 1.0)
    }
  }
}
