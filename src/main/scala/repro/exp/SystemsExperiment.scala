package repro.exp

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions.col
import repro.baselines._
import repro.core.{PlanConfig, QueryEngine, VideoProcessor}
import repro.sflow.{Queries, Query}
import repro.video.CostModel

/** §7.1 system comparisons (Fig. 5a and surrounding text). */
object SystemsExperiment {

  final case class EvaRow(query: String, evaS: Double, spatialyzeS: Double) {
    def speedup: Double = evaS / spatialyzeS
  }

  /** EVA comparison (Q5–Q8 run in series so EVA's materialized-UDF cache
    * is warm, §7.1.1). Spatialyze runs each query end-to-end with all
    * optimizations.
    */
  def eva(spark: SparkSession, ds: Dataset): Seq[EvaRow] = {
    val evaSim  = new EvaSim(spark)
    val queries = Seq(Queries.q5, Queries.q6, Queries.q7, Queries.q8)
    queries.map { q =>
      val evaRun = evaSim.run(ds.frames, ds.gtStates, ds.net, q)
      val proc   = VideoProcessor.run(spark, ds.frames, ds.gtStates, ds.net, q, PlanConfig.all, ds.fps)
      val cams = ds.frames.select(col("sceneId"), col("frameIdx"),
                                  col("camX").as("x"), col("camY").as("y"),
                                  col("camYaw").as("heading"))
      val qr    = QueryEngine.run(spark, q, proc.objs, cams, ds.roadsDf, ds.fps)
      val stats = proc.stats.copy(queryRowsExamined = qr.rowsExamined)
      EvaRow(q.name, evaRun.modeledMs / 1000.0, CostModel.workflowMs(stats) / 1000.0)
    }
  }

  final case class VivaRow(dataset: String, vivaS: Double, spatialyzeS: Double) {
    def speedup: Double = vivaS / spatialyzeS
  }

  /** VIVA comparison on Q9 over both datasets (§7.1.2). */
  def viva(spark: SparkSession, jackson: Dataset, nuscenes: Dataset): Seq[VivaRow] =
    Seq(jackson, nuscenes).map { ds =>
      val r = VivaSim.compare(spark, if (ds.params.flavour == "jackson") "jackson" else "nuscenes",
                              ds.frames, ds.gtStates, ds.net, Queries.q9, ds.fps)
      VivaRow(r.dataset, r.vivaMs / 1000.0, r.spatialyzeMs / 1000.0)
    }

  /** nuScenes devkit comparison (§7.1.3): Movable-Objects Query Engine
    * only, over the same processed objects.
    */
  def devkit(spark: SparkSession, ds: Dataset): Seq[DevkitRun] = {
    val queries = Seq(Queries.q1, Queries.q2, Queries.q3, Queries.q4)
    // Both engines query the same processed Movable Objects (SB plan).
    val proc = VideoProcessor.run(spark, ds.frames, ds.gtStates, ds.net,
                                  Queries.q2, PlanConfig.baseline, ds.fps)
    val cams = ds.frames.select(col("sceneId"), col("frameIdx"),
                                col("camX").as("x"), col("camY").as("y"),
                                col("camYaw").as("heading"))
    queries.map { q =>
      val qr = QueryEngine.run(spark, q, proc.objs, cams, ds.roadsDf, ds.fps)
      DevkitSim.compare(spark, q, proc.objs, ds.roadCountsByType, qr.rowsExamined)
    }
  }

  final case class OtifRow(otifFps: Double, otifTrainMin: Double,
                           spatialyzeFpsMin: Double, spatialyzeFpsMax: Double)

  /** OTIF comparison (§7.1.4): tracking throughput; Spatialyze's range is
    * its S6 video-processor FPS across Q1–Q4.
    */
  def otif(spark: SparkSession, ds: Dataset): OtifRow = {
    val o = OtifSim.run(spark, ds.frames, ds.gtStates)
    val fpsPerQuery = Seq(Queries.q1, Queries.q2, Queries.q3, Queries.q4).map { q =>
      val stats = VideoProcessor.run(spark, ds.frames, ds.gtStates, ds.net, q,
                                     PlanConfig.all, ds.fps).stats
      CostModel.fps(stats)
    }
    OtifRow(o.fps, o.trainMs / 60000.0, fpsPerQuery.min, fpsPerQuery.max)
  }

  /** SkyQuery comparison (§7.1.5) on the aerial Q10. */
  def sky(spark: SparkSession, ds: Dataset): SkyRun =
    SkyQuerySim.compare(spark, ds.frames, ds.gtStates, ds.net, Queries.q10Aerial, ds.fps)
}
