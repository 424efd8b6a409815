package repro.track

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Tracking-accuracy metrics (paper §7.2.2 uses HOTA's Association
  * Accuracy, AssA).
  *
  * Detections are identity-matched across runs by `did` (both runs see
  * byte-identical detections for the frames they both visit, so the
  * spatial matching step of full HOTA is exact here), which isolates
  * exactly what the ablation studies: association damage from dropped
  * frames.
  */
object Metrics {

  /** HOTA Association Accuracy of `pred` tracks against `gt` tracks.
    *
    * For every matched detection c with gt track g and predicted track p:
    * A(c) = |TPA| / (|TPA| + |FNA| + |FPA|) where TPA = matched detections
    * with the same (g, p), FNA = remaining detections of g, FPA = remaining
    * detections of p. AssA = mean of A(c) over matched detections.
    *
    * Both inputs are TrackedRow-shaped DataFrames. The caller restricts
    * `gt` to the evaluation universe (e.g. excluding RVP-pruned frames,
    * as §7.2.2 does).
    */
  def assA(spark: SparkSession, gt: DataFrame, pred: DataFrame): Double = {
    val g = gt.select(col("sceneId"), col("did"), col("trackId").as("gtTrack"))
    val p = pred.select(col("sceneId"), col("did"), col("trackId").as("prTrack"))

    val matched = g.join(p, Seq("sceneId", "did"))

    val tpa = matched.groupBy("sceneId", "gtTrack", "prTrack").agg(count("*").as("tpa"))
    val gtN = g.groupBy("sceneId", "gtTrack").agg(count("*").as("gtN"))
    val prN = p.groupBy("sceneId", "prTrack").agg(count("*").as("prN"))

    val perDet = matched
      .join(tpa, Seq("sceneId", "gtTrack", "prTrack"))
      .join(gtN, Seq("sceneId", "gtTrack"))
      .join(prN, Seq("sceneId", "prTrack"))
      .withColumn("a", col("tpa") / (col("gtN") + col("prN") - col("tpa")))

    val row = perDet.agg(avg("a").as("assa")).collect()(0)
    if (row.isNullAt(0)) 0.0 else row.getDouble(0)
  }

  /** Precision/recall-style association F1 across a frame gap (§6.4.3's
    * skip-distance study): for ground-truth objects detected at both ends
    * of a sampled gap, a prediction is a TP when the predicted tracker
    * keeps them on one track exactly when the baseline tracker does.
    */
  final case class SkipStats(skip: Int, tp: Long, fp: Long, fn: Long, gaps: Long) {
    def f1: Double = if (2 * tp + fp + fn == 0) 1.0 else 2.0 * tp / (2.0 * tp + fp + fn)
  }

  /** Driver-side gap analysis for one scene.
    *
    * @param gtByFrame   baseline (no-sampler) tracking: frame -> (oid -> trackId)
    * @param prByFrame   sampled-run tracking: frame -> (oid -> trackId)
    * @param sampledFrames frames the sampler kept, ascending
    */
  def gapOutcomes(gtByFrame: Map[Int, Map[Long, Long]],
                  prByFrame: Map[Int, Map[Long, Long]],
                  sampledFrames: Seq[Int]): Seq[(Int, Long, Long, Long)] = {
    sampledFrames.sorted.sliding(2).collect { case Seq(f0, f1) if f1 > f0 =>
      val skip = f1 - f0 - 1
      val gt0  = gtByFrame.getOrElse(f0, Map.empty); val gt1 = gtByFrame.getOrElse(f1, Map.empty)
      val pr0  = prByFrame.getOrElse(f0, Map.empty); val pr1 = prByFrame.getOrElse(f1, Map.empty)
      var (tp, fp, fn) = (0L, 0L, 0L)
      (gt0.keySet ++ gt1.keySet).foreach { oid =>
        val gtCont = gt0.get(oid).exists(t => gt1.get(oid).contains(t))
        val prCont = pr0.get(oid).exists(t => pr1.get(oid).contains(t))
        if (gtCont && prCont) tp += 1
        else if (!gtCont && prCont) fp += 1
        else if (gtCont && !prCont) fn += 1
      }
      (skip, tp, fp, fn)
    }.toSeq
  }
}
