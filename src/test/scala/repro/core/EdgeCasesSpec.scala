package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.sflow._
import repro.world.{GridParams, RoadNetwork, WorldGen, WorldParams}

/** Degenerate-input robustness of the workflow executor. */
class EdgeCasesSpec extends SparkSpec {

  private val p   = WorldParams.nuscenes(nScenes = 2)
  private val net = RoadNetwork.grid(p.grid)
  private lazy val frames = WorldGen.frames(spark, p).persist()
  private lazy val gt     = WorldGen.gtStates(spark, p).persist()

  private def world() =
    new SpatialyzeWorld(spark, p.fps).addGeogConstructs(net).addVideo(frames, gt)

  test("a query on a construct type that never appears prunes every frame and returns nothing") {
    val car = ObjRef("car")
    val pred = Pred.and(TypeIs(car, Set("car")),
                        Contains(GeoRef("g", "heliport"), Seq(car)),
                        DistanceLt(CamRef, car, 50.0))
    val res = world().filter(pred).observe(PlanConfig.all, "edge1")
    assert(res.stats.framesAfterRvp === 0L, "RVP prunes everything: no heliport exists")
    assert(res.rows.count() === 0L)
  }

  test("a query on an object type that never appears returns nothing but runs") {
    val uni = ObjRef("u")
    val pred = Pred.and(TypeIs(uni, Set("unicorn")),
                        Contains(GeoRef("i", "intersection"), Seq(uni)),
                        DistanceLt(CamRef, uni, 50.0))
    val res = world().filter(pred).observe(PlanConfig.all, "edge2")
    assert(res.stats.detsAfterOtp === 0L)
    assert(res.rows.count() === 0L)
    assert(OutputComposer.snippets(res.rows).isEmpty)
  }

  test("an impossible distance bound returns nothing") {
    val car = ObjRef("car")
    val pred = Pred.and(TypeIs(car, Set("car")), DistanceLt(CamRef, car, 0.01))
    val res = world().filter(pred).observe(PlanConfig.all, "edge3")
    assert(res.rows.count() === 0L)
  }

  test("Or predicates compile and widen the result") {
    val o = ObjRef("o")
    val carsOnly = world().filter(Pred.and(
      TypeIs(o, Set("car")), DistanceLt(CamRef, o, 50.0))).observe(PlanConfig.baseline, "edge4a")
    val carsOrPeds = world().filter(Pred.and(
      Or(Seq(TypeIs(o, Set("car")), TypeIs(o, Set("pedestrian")))),
      DistanceLt(CamRef, o, 50.0))).observe(PlanConfig.baseline, "edge4b")
    assert(carsOrPeds.rows.count() >= carsOnly.rows.count())
    assert(carsOrPeds.sql.contains(" OR "))
  }

  test("an Or at the top level disables OTP (unconstrained semantics stay sound)") {
    val o = ObjRef("o")
    val pred = Pred.and(Or(Seq(TypeIs(o, Set("car")), Contains(GeoRef("i", "intersection"), Seq(o)))),
                        DistanceLt(CamRef, o, 50.0))
    val req = Analyzer.analyze(pred)
    assert(req.typesOfInterest.isEmpty, "Or-ed type constraint must not trigger OTP")
    assert(req.rvpTargets.isEmpty, "Or-ed contains must not trigger RVP")
  }

  test("a world with zero scenes runs end to end") {
    val empty = WorldParams.nuscenes(nScenes = 1).copy(nFrames = 1, nObjects = 1)
    val f = WorldGen.frames(spark, empty)
    val g = WorldGen.gtStates(spark, empty).filter("oid < 0") // no objects
    val res = new SpatialyzeWorld(spark, empty.fps).addGeogConstructs(net)
      .addVideo(f, g).filter(Queries.q5.pred).observe(PlanConfig.all, "edge5")
    assert(res.rows.count() === 0L)
  }

  test("a tiny grid road network still supports the pipeline") {
    val tiny    = RoadNetwork.grid(GridParams(nx = 2, ny = 2, bikeLaneEvery = 0))
    assert(tiny.ofType("bikeLane").isEmpty)
    val tinyRes = new SpatialyzeWorld(spark, p.fps).addGeogConstructs(tiny)
      .addVideo(frames, gt).filter(Queries.q5.pred).observe(PlanConfig.all, "edge6")
    assert(tinyRes.rows.count() >= 0L)
  }
}
