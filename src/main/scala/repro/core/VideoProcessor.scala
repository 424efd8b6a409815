package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.sflow.Query
import repro.track.SortTracker
import repro.video.{CostModel, Estimators, RunStats, SimDetector}
import repro.world.RoadNetwork

/** Which optimization operators the plan enables (the §7.2 ablation knobs:
  * SB = none, S6 = all).
  */
final case class PlanConfig(rvp: Boolean, otp: Boolean, geom3d: Boolean, efs: Boolean)

object PlanConfig {
  val baseline: PlanConfig = PlanConfig(rvp = false, otp = false, geom3d = false, efs = false)
  val all: PlanConfig      = PlanConfig(rvp = true, otp = true, geom3d = true, efs = true)
}

/** Output of the video processor: the Movable-Objects samples ready for
  * the query engine, plus execution statistics and the surviving frames
  * (needed by the output composer and the accuracy evaluation).
  */
final case class ProcessResult(objs: DataFrame,
                               tracked: Option[DataFrame],
                               keptFrames: DataFrame,
                               sampledFrames: Option[DataFrame],
                               stats: RunStats)

/** The Video Processor stage (§5.2.2): builds the streaming-operator plan
  * Decode → [RVP] → Detect → [OTP] → 3D-Estimate → [EFS] → Track, keeping
  * only the operators the filter predicate requires (e.g. detection-only
  * queries never run the tracker), and instruments every stage for the
  * cost model.
  */
object VideoProcessor {

  def run(spark: SparkSession, frames: DataFrame, gtStates: DataFrame, net: RoadNetwork,
          query: Query, config: PlanConfig, fps: Double): ProcessResult = {
    val req = query.requirements

    val framesTotal = frames.count()

    // Road Visibility Pruner — placed right after the decoder (§6.1).
    val rvpApplied = config.rvp && req.rvpTargets.nonEmpty
    val kept =
      (if (rvpApplied) RoadVisibilityPruner.prune(spark, frames, net, req.rvpTargets)
       else frames).persist()
    val framesAfterRvp = kept.count()

    // Object detector.
    val dets       = SimDetector.detect(spark, kept, gtStates).persist()
    val detections = dets.count()

    // Object Type Pruner — right after the detector (§6.2).
    val otpApplied = config.otp && req.typesOfInterest.isDefined
    val detsTyped =
      (if (otpApplied) ObjectTypePruner.prune(dets, req.typesOfInterest.get) else dets).persist()
    val detsAfterOtp = detsTyped.count()

    // 3D location estimation (§6.3): geometry when every type of interest
    // touches the ground, the ML depth model otherwise.
    val geomApplied = config.geom3d && req.geomApplicable
    val dets3d =
      (if (geomApplied) Estimators.geometry(spark, detsTyped)
       else Estimators.ml(spark, detsTyped)).persist()
    val geomDets = if (geomApplied) dets3d.filter(col("method") === "geom").count() else 0L
    val depthFrames =
      if (geomApplied)
        dets3d.filter(col("method") === "geom_fallback")
          .select("sceneId", "frameIdx").distinct().count()
      else dets3d.select("sceneId", "frameIdx").distinct().count()

    // Exit Frame Sampler (§6.4): restrict the tracker to sampled frames.
    val efsApplied = config.efs && req.efsApplicable
    val sampled =
      if (efsApplied) Some(ExitFrameSampler.sample(spark, kept, dets3d, net, fps).persist())
      else None
    val trackerInput =
      sampled.fold(dets3d)(s => dets3d.join(s, Seq("sceneId", "frameIdx"))).persist()

    // Object tracker — only when the predicate needs trajectories.
    val trackerRan = req.needsTracking
    val (tracked, trackerFrames, trackerDets, trackerPairOps) =
      if (trackerRan) {
        val t = new SortTracker().track(spark, trackerInput).persist()
        t.count()
        val perFrame = trackerInput.groupBy("sceneId", "frameIdx").agg(count("*").as("n"))
        val w        = Window.partitionBy("sceneId").orderBy("frameIdx")
        val pairRow = perFrame
          .withColumn("prev", lag("n", 1).over(w))
          .agg(sum(col("n") * coalesce(col("prev"), lit(0L))).as("pairs"),
               count("*").as("frames"), sum("n").as("dets"))
          .collect()(0)
        (Some(t),
         if (pairRow.isNullAt(1)) 0L else pairRow.getLong(1),
         if (pairRow.isNullAt(2)) 0L else pairRow.getLong(2),
         if (pairRow.isNullAt(0)) 0L else pairRow.getLong(0))
      } else (None, 0L, 0L, 0L)

    // Standard Movable-Objects sample schema for the query engine. When
    // tracking ran, oid is the track id (headings/speeds derivable);
    // otherwise each detection stands alone.
    val objs = tracked match {
      case Some(t) =>
        t.select(col("sceneId"), col("frameIdx"), col("trackId").as("oid"),
                 col("otype"), col("estX").as("x"), col("estY").as("y"))
      case None =>
        dets3d.select(col("sceneId"), col("frameIdx"), col("did").as("oid"),
                      col("otype"), col("estX").as("x"), col("estY").as("y"))
    }

    val stats = RunStats(
      framesTotal = framesTotal, framesAfterRvp = framesAfterRvp,
      detections = detections, detsAfterOtp = detsAfterOtp,
      depthFrames = depthFrames, geomDets = geomDets,
      trackerFrames = trackerFrames, trackerDets = trackerDets,
      trackerPairOps = trackerPairOps, trackerRan = trackerRan,
      rvpApplied = rvpApplied, otpApplied = otpApplied,
      geomApplied = geomApplied, efsApplied = efsApplied)

    ProcessResult(objs, tracked, kept.select("sceneId", "frameIdx"), sampled, stats)
  }
}
