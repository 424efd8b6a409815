package repro.track

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

class MetricsSpec extends SparkSpec {

  private def tr(frame: Int, track: Long, did: Long, oid: Long = 0L, scene: Long = 0L): TrackedRow =
    TrackedRow(scene, frame, track, did, oid, "car", 0, 0)

  private def df(rows: Seq[TrackedRow]) = {
    import spark.implicits._
    spark.createDataset(rows).toDF()
  }

  test("identical tracks give AssA = 1") {
    val rows = (0 until 10).map(f => tr(f, 1, f))
    assert(Metrics.assA(spark, df(rows), df(rows)) === 1.0)
  }

  test("a track split in half gives AssA ~ 0.5") {
    val gt = (0 until 10).map(f => tr(f, 1, f))
    val pr = (0 until 5).map(f => tr(f, 1, f)) ++ (5 until 10).map(f => tr(f, 2, f))
    val assa = Metrics.assA(spark, df(gt), df(pr))
    // Each matched det: TPA=5, gtN=10, prN=5 -> 5/10 = 0.5.
    assert(math.abs(assa - 0.5) < 1e-9, s"assa $assa")
  }

  test("two gt tracks merged into one prediction track are penalized") {
    val gt = (0 until 10).map(f => tr(f, 1, f)) ++ (0 until 10).map(f => tr(f, 2, 100 + f))
    val pr = gt.map(_.copy(trackId = 7))
    val assa = Metrics.assA(spark, df(gt), df(pr))
    // TPA=10, gtN=10, prN=20 -> 10/20 = 0.5.
    assert(math.abs(assa - 0.5) < 1e-9)
  }

  test("missing detections in the prediction reduce AssA via gtN") {
    val gt = (0 until 10).map(f => tr(f, 1, f))
    val pr = (0 until 5).map(f => tr(f, 1, f)) // half the dets missing
    val assa = Metrics.assA(spark, df(gt), df(pr))
    // Matched dets: TPA=5, gtN=10, prN=5 -> 5/10.
    assert(math.abs(assa - 0.5) < 1e-9)
  }

  test("AssA of disjoint det sets is 0 (no matches)") {
    val gt = (0 until 5).map(f => tr(f, 1, f))
    val pr = (0 until 5).map(f => tr(f, 1, 1000 + f))
    assert(Metrics.assA(spark, df(gt), df(pr)) === 0.0)
  }

  test("AssA respects scene boundaries") {
    val gt = (0 until 5).map(f => tr(f, 1, f, scene = 0)) ++ (0 until 5).map(f => tr(f, 1, f, scene = 1))
    val pr = gt
    assert(Metrics.assA(spark, df(gt), df(pr)) === 1.0)
  }

  test("gapOutcomes counts continuity TPs") {
    val gt = Map(0 -> Map(1L -> 10L), 5 -> Map(1L -> 10L))
    val pr = Map(0 -> Map(1L -> 20L), 5 -> Map(1L -> 20L))
    val out = Metrics.gapOutcomes(gt, pr, Seq(0, 5))
    assert(out === Seq((4, 1L, 0L, 0L)))
  }

  test("gapOutcomes counts FN when the prediction splits a continuous track") {
    val gt = Map(0 -> Map(1L -> 10L), 5 -> Map(1L -> 10L))
    val pr = Map(0 -> Map(1L -> 20L), 5 -> Map(1L -> 21L))
    val out = Metrics.gapOutcomes(gt, pr, Seq(0, 5))
    assert(out === Seq((4, 0L, 0L, 1L)))
  }

  test("gapOutcomes counts FP when the prediction bridges a broken track") {
    val gt = Map(0 -> Map(1L -> 10L), 5 -> Map(1L -> 11L))
    val pr = Map(0 -> Map(1L -> 20L), 5 -> Map(1L -> 20L))
    val out = Metrics.gapOutcomes(gt, pr, Seq(0, 5))
    assert(out === Seq((4, 0L, 1L, 0L)))
  }

  test("gapOutcomes handles objects present at only one end") {
    val gt = Map(0 -> Map(1L -> 10L), 5 -> Map(2L -> 12L))
    val pr = Map(0 -> Map(1L -> 20L), 5 -> Map(2L -> 22L))
    val out = Metrics.gapOutcomes(gt, pr, Seq(0, 5))
    // Neither object is continuous in gt nor pr: no TP/FP/FN.
    assert(out === Seq((4, 0L, 0L, 0L)))
  }

  test("SkipStats F1") {
    assert(Metrics.SkipStats(1, tp = 5, fp = 0, fn = 0, gaps = 5).f1 === 1.0)
    assert(Metrics.SkipStats(1, tp = 0, fp = 0, fn = 0, gaps = 0).f1 === 1.0)
    assert(math.abs(Metrics.SkipStats(1, tp = 1, fp = 1, fn = 1, gaps = 3).f1 - 0.5) < 1e-9)
  }
}
