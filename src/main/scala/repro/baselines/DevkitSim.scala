package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.sflow.{Pred, Query}
import repro.video.CostModel

/** nuScenes-devkit-style evaluation of one query against already-processed
  * Movable Objects.
  */
final case class DevkitRun(query: String, devkitMs: Double, spatialyzeMs: Double,
                           devkitRows: Double, spatialyzeRows: Long, oom: Boolean) {
  def speedup: Double = if (oom) Double.PositiveInfinity else devkitMs / spatialyzeMs
}

/** nuScenes devkit stand-in (§7.1.3): queries the Movable-Objects data
  * through Python-loop materialization — for every frame, every k-tuple
  * of annotations is combined with EVERY construct of the referenced
  * type (no spatial index, no pre-generated columns) and checked with
  * per-row linear algebra. The candidate count is measured from the same
  * data the real engine queries; runtime = candidates × PyPerRowMs.
  * Materializing more than DevkitOomRows combinations reproduces the
  * paper's Q4 out-of-memory failure.
  *
  * Spatialyze's Movable-Objects Query Engine cost = its (temporally
  * aligned, bbox-prefiltered) candidates × SqlPerRowMs.
  */
object DevkitSim {

  def compare(spark: SparkSession, query: Query, objs: DataFrame,
              roadCountsByType: Map[String, Long], spatialyzeRows: Long): DevkitRun = {
    val k = math.max(1, Pred.objRefs(query.pred).size)
    val geoFactor = Pred.geoRefs(query.pred)
      .map(g => roadCountsByType.getOrElse(g.geoType, 1L).toDouble)
      .product

    val sumNk = objs.groupBy("sceneId", "frameIdx").count()
      .agg(sum(pow(col("count"), lit(k.toDouble)))).collect()(0)
    val tupleRows = if (sumNk.isNullAt(0)) 0.0 else sumNk.getDouble(0)

    val devkitRows = tupleRows * geoFactor
    val oom        = devkitRows > CostModel.DevkitOomRows
    DevkitRun(query.name,
              devkitMs = devkitRows * CostModel.PyPerRowMs,
              spatialyzeMs = spatialyzeRows * CostModel.SqlPerRowMs,
              devkitRows = devkitRows, spatialyzeRows = spatialyzeRows, oom = oom)
  }
}
