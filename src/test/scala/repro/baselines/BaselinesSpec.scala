package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.exp.Scenarios
import repro.sflow.Queries
import repro.video.CostModel

class BaselinesSpec extends SparkSpec {

  private lazy val nus = Scenarios.nuscenes(spark, nScenes = 3)
  private lazy val jak = Scenarios.jackson(spark, nClips = 3)
  private lazy val sky = Scenarios.sky(spark, nFlights = 2)

  test("EVA: the first query pays the detector, later queries hit the materialized cache") {
    val eva = new EvaSim(spark)
    val r5  = eva.run(nus.frames, nus.gtStates, nus.net, Queries.q5)
    val r6  = eva.run(nus.frames, nus.gtStates, nus.net, Queries.q6)
    assert(r5.modeledMs > r6.modeledMs, "cache must make the second query cheaper")
    val perFrameDelta = (r5.modeledMs - r6.modeledMs) / nus.frames.count()
    assert(math.abs(perFrameDelta - (CostModel.DecodeMs + CostModel.YoloMs - CostModel.EvaCacheReadMs)) < 1e-6)
  }

  test("EVA: still pays the depth model on every query (why Spatialyze wins Q5-Q7)") {
    val eva = new EvaSim(spark)
    val r6  = eva.run(nus.frames, nus.gtStates, nus.net, Queries.q6)
    assert(r6.modeledMs > CostModel.MonodepthMs * nus.frames.count())
  }

  test("EVA produces matching frames for the built-in scenarios") {
    val eva = new EvaSim(spark)
    val r5  = eva.run(nus.frames, nus.gtStates, nus.net, Queries.q5)
    assert(r5.resultFrames > 0, "pedestrians at intersections exist in the world")
  }

  test("VIVA comparison: speedup on the static jackson camera is smaller than on nuScenes") {
    val j = VivaSim.compare(spark, "jackson", jak.frames, jak.gtStates, jak.net, Queries.q9, jak.fps)
    val n = VivaSim.compare(spark, "nuscenes", nus.frames, nus.gtStates, nus.net, Queries.q9, nus.fps)
    info(f"jackson ${j.speedup}%.2f x, nuscenes ${n.speedup}%.2f x (paper: 1.68x / 6x)")
    assert(j.speedup > 1.0, "Spatialyze must beat VIVA on jackson")
    assert(n.speedup > j.speedup, "moving-camera dataset must benefit more (RVP + no depth)")
  }

  test("devkit comparison: three-digit speedups from index-free cross products (paper 117-716x)") {
    val proc = repro.core.VideoProcessor.run(spark, nus.frames, nus.gtStates, nus.net,
                                             Queries.q2, repro.core.PlanConfig.baseline, nus.fps)
    val cams = nus.frames.selectExpr("sceneId", "frameIdx", "camX as x", "camY as y", "camYaw as heading")
    val qr = repro.core.QueryEngine.run(spark, Queries.q2, proc.objs, cams, nus.roadsDf, nus.fps)
    val r  = DevkitSim.compare(spark, Queries.q2, proc.objs, nus.roadCountsByType, qr.rowsExamined)
    info(f"Q2 devkit speedup ${r.speedup}%.0f x")
    assert(!r.oom)
    assert(r.speedup > 50 && r.speedup < 2000, s"speedup ${r.speedup} outside plausible band")
  }

  test("devkit comparison: Q4's triple self-join exceeds memory (the paper's OOM)") {
    val proc = repro.core.VideoProcessor.run(spark, nus.frames, nus.gtStates, nus.net,
                                             Queries.q2, repro.core.PlanConfig.baseline, nus.fps)
    val r = DevkitSim.compare(spark, Queries.q4, proc.objs, nus.roadCountsByType, 1000L)
    assert(r.oom, s"Q4 devkit rows ${r.devkitRows} should exceed ${CostModel.DevkitOomRows}")
  }

  test("OTIF: throughput lands near the paper's 17.3 fps and training time is reported") {
    val r = OtifSim.run(spark, nus.frames, nus.gtStates)
    info(f"OTIF ${r.fps}%.1f fps (paper 17.3)")
    assert(r.fps > 10 && r.fps < 30, s"OTIF fps ${r.fps}")
    assert(r.trainMs === CostModel.OtifTrainMs)
  }

  test("SkyQuery: Spatialyze's RVP yields a moderate speedup on the aerial workload (paper 1.18x)") {
    val r = SkyQuerySim.compare(spark, sky.frames, sky.gtStates, sky.net, Queries.q10Aerial, sky.fps)
    info(f"SkyQuery ${r.skyQueryFps}%.2f fps vs Spatialyze ${r.spatialyzeFps}%.2f fps " +
         f"(${r.speedup}%.2f x, pruned ${r.prunedFraction * 100}%.1f%%)")
    assert(r.speedup > 1.0, "RVP must prune some frames")
    assert(r.speedup < 2.0, "aerial pruning should be moderate")
    assert(r.prunedFraction > 0.02 && r.prunedFraction < 0.6, s"pruned ${r.prunedFraction}")
  }

  test("SkyQuery fps values are in the paper's single-digit ballpark") {
    val r = SkyQuerySim.compare(spark, sky.frames, sky.gtStates, sky.net, Queries.q10Aerial, sky.fps)
    assert(r.skyQueryFps > 2 && r.skyQueryFps < 12, s"${r.skyQueryFps} (paper 5.15)")
    assert(r.spatialyzeFps > r.skyQueryFps)
  }
}
