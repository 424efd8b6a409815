package repro.video

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.world.{WorldGen, WorldParams}

class EstimatorsSpec extends SparkSpec {

  private val p = WorldParams.nuscenes(nScenes = 2)
  private lazy val frames = WorldGen.frames(spark, p).persist()
  private lazy val gt     = WorldGen.gtStates(spark, p).persist()
  private lazy val dets   = SimDetector.detect(spark, frames, gt).persist()

  import org.apache.spark.sql.functions._

  test("geometry estimator recovers ground-truth positions to sub-meter accuracy") {
    import spark.implicits._
    val rows = Estimators.geometry(spark, dets).as[Det3dRow].collect()
    val geomRows = rows.filter(_.method == "geom")
    assert(geomRows.nonEmpty)
    val errs = geomRows.map(d => math.hypot(d.estX - d.gtX, d.estY - d.gtY))
    val mean = errs.sum / errs.size
    info(f"geometry mean error $mean%.3f m, max ${errs.max}%.3f m")
    assert(mean < 1.0, s"geometry estimator mean error $mean m")
  }

  test("ML estimator is noisier than the geometry estimator but unbiased-ish") {
    import spark.implicits._
    val geom = Estimators.geometry(spark, dets).as[Det3dRow].collect()
      .filter(_.method == "geom").map(d => math.hypot(d.estX - d.gtX, d.estY - d.gtY))
    val ml = Estimators.ml(spark, dets).as[Det3dRow].collect()
      .map(d => math.hypot(d.estX - d.gtX, d.estY - d.gtY))
    val geomMean = geom.sum / geom.size
    val mlMean   = ml.sum / ml.size
    info(f"geom mean $geomMean%.3f m, ml mean $mlMean%.3f m")
    assert(mlMean > geomMean, "depth-noise path should be less accurate than ray-casting")
    assert(mlMean < 8.0, s"ML error unreasonably large: $mlMean")
  }

  test("ml estimator marks every row 'ml'") {
    val methods = Estimators.ml(spark, dets).select("method").distinct().collect().map(_.getString(0))
    assert(methods.toSet === Set("ml"))
  }

  test("geometry estimator falls back to ML only for above-horizon boxes") {
    val byMethod = Estimators.geometry(spark, dets).groupBy("method").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    info(s"methods: $byMethod")
    assert(byMethod.contains("geom"))
    val fallback = byMethod.getOrElse("geom_fallback", 0L)
    assert(fallback < byMethod("geom") / 10, "fallbacks should be rare for ground objects")
  }

  test("estimators preserve row count and detection identity") {
    val g = Estimators.geometry(spark, dets)
    assert(g.count() === dets.count())
    assert(g.select("did").distinct().count() === dets.select("did").distinct().count())
  }

  test("estimators are deterministic") {
    val a = Estimators.ml(spark, dets).orderBy("did").collect().map(_.toString)
    val b = Estimators.ml(spark, dets).orderBy("did").collect().map(_.toString)
    assert(a.sameElements(b))
  }
}
