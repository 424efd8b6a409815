package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite
import repro.{Oracle, SparkSpec}
import repro.sflow._
import repro.world.{GridParams, RoadNetwork}

/** Engine-level tests over hand-crafted Movable-Objects tracks with known
  * geometry; relational behaviour is cross-checked against DuckDB.
  */
class QueryEngineSpec extends SparkSpec {

  private val fps  = 12.0
  private val net  = RoadNetwork.grid(GridParams())
  private lazy val roadsDf = net.toDF(spark).persist()

  /** Hand-crafted world at the intersection (80, 0):
    *  - oid 1: car eastbound through the intersection (y=-1.75)
    *  - oid 2: car westbound through the intersection (y=+1.75)
    *  - oid 3: pedestrian crossing north through the intersection
    *  - oid 4: car stopped in the bike lane strip (y=+4.2)
    *  - oid 5: car driving east far from the intersection (y=-81.75)
    */
  private lazy val objs: DataFrame = {
    import spark.implicits._
    val rows = (0 until 60).flatMap { f =>
      Seq(
        (0L, f, 1L, "car", 50.0 + 0.8 * f, -1.75),
        (0L, f, 2L, "car", 110.0 - 0.8 * f, 1.75),
        (0L, f, 3L, "pedestrian", 80.5, -6.0 + 0.15 * f),
        (0L, f, 4L, "car", 40.0, 4.2),
        (0L, f, 5L, "car", 30.0 + 0.8 * f, -81.75))
    }
    rows.toDF("sceneId", "frameIdx", "oid", "otype", "x", "y").persist()
  }

  /** Static camera just west of the intersection, looking east, on the
    * eastbound lane.
    */
  private lazy val cams: DataFrame = {
    import spark.implicits._
    (0 until 60).map(f => (0L, f, 60.0, -1.75, 0.0))
      .toDF("sceneId", "frameIdx", "x", "y", "heading").persist()
  }

  private def q(name: String, pred: Pred): Query = Query(name, name, pred)

  test("enrich derives headings from track displacement") {
    val e = QueryEngine.enrich(objs, fps)
    val h1 = e.filter(col("oid") === 1 && col("heading").isNotNull)
      .agg(avg("heading")).collect()(0).getDouble(0)
    assert(math.abs(h1 - 0.0) < 1.0, s"eastbound heading $h1")
    val h2 = e.filter(col("oid") === 2 && col("heading").isNotNull)
      .agg(avg("heading")).collect()(0).getDouble(0)
    assert(math.abs(h2 - 180.0) < 1.0, s"westbound heading $h2")
  }

  test("enrich derives speed in m/s") {
    val e = QueryEngine.enrich(objs, fps)
    val s1 = e.filter(col("oid") === 1 && col("speed").isNotNull)
      .agg(avg("speed")).collect()(0).getDouble(0)
    assert(math.abs(s1 - 0.8 * fps) < 0.1, s"speed $s1 vs ${0.8 * fps}")
  }

  test("enrich leaves stationary objects without a heading") {
    val e = QueryEngine.enrich(objs, fps)
    assert(e.filter(col("oid") === 4 && col("heading").isNotNull).count() === 0L)
  }

  test("aggregates flag stopped tracks and only those") {
    val agg = QueryEngine.aggregates(QueryEngine.enrich(objs, fps))
    val stopped = agg.filter(col("stopped")).select("oid").collect().map(_.getLong(0)).toSet
    assert(stopped === Set(4L))
  }

  test("aggregates flag left turns") {
    import spark.implicits._
    // A track that goes east then north (a left turn).
    val turn = (0 until 30).map(f => (1L, f, 9L, "car", 0.0 + 0.8 * f, 0.0)) ++
      (30 until 60).map(f => (1L, f, 9L, "car", 24.0, 0.8 * (f - 30)))
    val agg = QueryEngine.aggregates(QueryEngine.enrich(
      turn.toDF("sceneId", "frameIdx", "oid", "otype", "x", "y"), fps))
    assert(agg.filter(col("turnleft")).count() === 1L)
    // A right turn (east then south) must NOT count.
    val rightTurn = (0 until 30).map(f => (2L, f, 8L, "car", 0.0 + 0.8 * f, 0.0)) ++
      (30 until 60).map(f => (2L, f, 8L, "car", 24.0, -0.8 * (f - 30)))
    val agg2 = QueryEngine.aggregates(QueryEngine.enrich(
      rightTurn.toDF("sceneId", "frameIdx", "oid", "otype", "x", "y"), fps))
    assert(agg2.filter(col("turnleft")).count() === 0L)
  }

  test("single-object containment query returns exactly the frames inside the polygon") {
    val person = ObjRef("p")
    val pred = Pred.and(TypeIs(person, Set("pedestrian")),
                        Contains(GeoRef("i", "intersection"), Seq(person)),
                        DistanceLt(CamRef, person, 50.0))
    val res = QueryEngine.run(spark, q("tq1", pred), objs, cams, roadsDf, fps)
    val frames = res.rows.select("frameIdx").collect().map(_.getInt(0)).sorted
    // Pedestrian y = -6 + 0.15 f is inside the intersection square
    // ([76.5,83.5] x [-3.5,3.5]) for f in [17, 60) -> 0.15f in [2.5, 9.5].
    val expected = (0 until 60).filter { f =>
      val y = -6.0 + 0.15 * f
      y >= -3.5 && y <= 3.5
    }
    assert(frames.toSeq === expected, s"got ${frames.toSeq}")
  }

  test("the same query cross-checked relationally against DuckDB") {
    val person = ObjRef("p")
    val pred = Pred.and(TypeIs(person, Set("pedestrian")),
                        Contains(GeoRef("i", "intersection"), Seq(person)),
                        DistanceLt(CamRef, person, 50.0))
    val res = QueryEngine.run(spark, q("tq2", pred), objs, cams, roadsDf, fps)

    // Precompute the spatial predicates in Spark; DuckDB then verifies the
    // relational plan (joins, distinct, filters) over the exported table.
    repro.catalyst.SpatialFunctions.register(spark)
    objs.createOrReplaceTempView("oracle_objs")
    cams.createOrReplaceTempView("oracle_cams")
    roadsDf.createOrReplaceTempView("oracle_roads")
    val flat = spark.sql(
      """SELECT o.sceneId, o.frameIdx, o.oid, o.otype,
                CAST(MAX(CASE WHEN r.rtype = 'intersection'
                              AND st_contains(r.xs, r.ys, o.x, o.y) THEN 1 ELSE 0 END) AS STRING) AS in_i,
                CAST(MAX(CASE WHEN st_distance(o.x, o.y, c.x, c.y) < 50.0 THEN 1 ELSE 0 END) AS STRING) AS near
         FROM oracle_objs o
         JOIN oracle_cams c ON c.sceneId = o.sceneId AND c.frameIdx = o.frameIdx
         CROSS JOIN oracle_roads r
         GROUP BY o.sceneId, o.frameIdx, o.oid, o.otype""")
    val sparkSide = res.rows.select(
      col("sceneId").cast("long").as("sceneid"),
      col("frameIdx").cast("long").as("frameidx"),
      col("p_oid").cast("long").as("p_oid"))
    Oracle.assertEquivalent(sparkSide,
      """SELECT DISTINCT CAST(sceneId AS BIGINT) AS sceneid, CAST(frameIdx AS BIGINT) AS frameidx,
                         CAST(oid AS BIGINT) AS p_oid
         FROM flat WHERE otype = 'pedestrian' AND in_i = '1' AND near = '1'""",
      "flat" -> flat)
  }

  test("two-object opposite-direction query finds the crossing cars and not the parked one") {
    val c1 = ObjRef("c1"); val c2 = ObjRef("c2")
    val pred = Pred.and(TypeIs(c1, Set("car")), TypeIs(c2, Set("car")),
                        Contains(GeoRef("i", "intersection"), Seq(c1, c2)),
                        Pred.opposite(c1, c2),
                        DistanceLt(CamRef, c1, 50.0), DistanceLt(CamRef, c2, 50.0))
    val res = QueryEngine.run(spark, q("tq3", pred), objs, cams, roadsDf, fps)
    val pairs = res.rows.select("c1_oid", "c2_oid").distinct().collect()
      .map(r => Set(r.getLong(0), r.getLong(1)))
    assert(pairs.nonEmpty, "crossing cars must match")
    assert(pairs.forall(_ === Set(1L, 2L)), s"unexpected pairs ${pairs.toSeq}")
    // Both orderings are returned (c1/c2 are interchangeable roles).
    val frames = res.rows.select("frameIdx").distinct().collect().map(_.getInt(0))
    // Cars overlap inside the intersection while both x in [76.5, 83.5].
    frames.foreach { f =>
      val x1 = 50.0 + 0.8 * f; val x2 = 110.0 - 0.8 * f
      assert(x1 >= 76.4 && x1 <= 83.6 && x2 >= 76.4 && x2 <= 83.6, s"frame $f: $x1 $x2")
    }
  }

  test("heading predicates against the camera work (perpendicular pedestrian)") {
    val person = ObjRef("p")
    val pred = Pred.and(TypeIs(person, Set("pedestrian")),
                        Pred.perpendicular(person, CamRef),
                        DistanceLt(CamRef, person, 50.0))
    val res = QueryEngine.run(spark, q("tq4", pred), objs, cams, roadsDf, fps)
    val oids = res.rows.select("p_oid").distinct().collect().map(_.getLong(0)).toSet
    assert(oids === Set(3L), "the northbound pedestrian is perpendicular to the east-facing camera")
  }

  test("contains with the camera term uses camera coordinates") {
    val c = ObjRef("c")
    // Camera sits on the eastbound lane; require the car on the same lane.
    val pred = Pred.and(TypeIs(c, Set("car")),
                        Contains(GeoRef("l", "lane"), Seq(CamRef, c)),
                        DistanceLt(CamRef, c, 50.0))
    val res  = QueryEngine.run(spark, q("tq5", pred), objs, cams, roadsDf, fps)
    val oids = res.rows.select("c_oid").distinct().collect().map(_.getLong(0)).toSet
    assert(oids === Set(1L), s"only the eastbound car shares the camera's lane, got $oids")
  }

  test("stopped query finds the bike-lane car (Q10 shape)") {
    val c = ObjRef("c")
    val pred = Pred.and(TypeIs(c, Set("car")),
                        Contains(GeoRef("b", "bikeLane"), Seq(c)),
                        Stopped(c),
                        DistanceLt(CamRef, c, 50.0))
    val res  = QueryEngine.run(spark, q("tq6", pred), objs, cams, roadsDf, fps)
    val oids = res.rows.select("c_oid").distinct().collect().map(_.getLong(0)).toSet
    assert(oids === Set(4L), s"got $oids")
  }

  test("rowsExamined scales with the number of object refs") {
    val c1 = ObjRef("c1"); val c2 = ObjRef("c2")
    val single = QueryEngine.run(spark, q("tq7",
      Pred.and(TypeIs(c1, Set("car")), DistanceLt(CamRef, c1, 50.0))), objs, cams, roadsDf, fps)
    val double = QueryEngine.run(spark, q("tq8",
      Pred.and(TypeIs(c1, Set("car")), TypeIs(c2, Set("car")),
               DistanceLt(CamRef, c1, 50.0), DistanceLt(CamRef, c2, 50.0),
               Pred.opposite(c1, c2))), objs, cams, roadsDf, fps)
    assert(double.rowsExamined > single.rowsExamined)
  }

  test("generated SQL uses the registered spatial functions and temporal join keys") {
    val person = ObjRef("p")
    val pred = Pred.and(TypeIs(person, Set("pedestrian")),
                        Contains(GeoRef("i", "intersection"), Seq(person)),
                        DistanceLt(CamRef, person, 50.0))
    val res = QueryEngine.run(spark, q("tq9", pred), objs, cams, roadsDf, fps)
    assert(res.sql.contains("st_contains("))
    assert(res.sql.contains("st_distance("))
    assert(res.sql.contains("cam.sceneId = p.sceneId") || res.sql.contains("cam.sceneId"))
  }

  test("engine results are deterministic") {
    val person = ObjRef("p")
    val pred = Pred.and(TypeIs(person, Set("pedestrian")),
                        Contains(GeoRef("i", "intersection"), Seq(person)),
                        DistanceLt(CamRef, person, 50.0))
    val a = QueryEngine.run(spark, q("tq10", pred), objs, cams, roadsDf, fps)
      .rows.orderBy("frameIdx").collect().map(_.toString)
    val b = QueryEngine.run(spark, q("tq11", pred), objs, cams, roadsDf, fps)
      .rows.orderBy("frameIdx").collect().map(_.toString)
    assert(a.sameElements(b))
  }
}
