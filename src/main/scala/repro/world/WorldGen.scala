package repro.world

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.geom._

/** Per-frame camera metadata — the geospatial half of a GeospatialVideo
  * (paper §4.2.2): the Camera movable object's location, rotation (yaw /
  * pitch, quaternion-equivalent) and intrinsics at each timestamp.
  */
final case class FrameRow(sceneId: Long, frameIdx: Int, ts: Double,
                          camX: Double, camY: Double, camZ: Double,
                          camYaw: Double, camPitch: Double,
                          fx: Double, fy: Double, skew: Double, px0: Double, py0: Double,
                          imgW: Int, imgH: Int) {
  def pose: CamPose        = CamPose(camX, camY, camZ, camYaw, camPitch)
  def intrinsics: Intrinsics = Intrinsics(fx, fy, skew, px0, py0, imgW, imgH)
}

/** Latent ground truth: where each real-world object actually is at each
  * frame. This plays the role of the video pixels — ONLY the simulated
  * object detector may observe it; Spatialyze operators never do.
  */
final case class GtStateRow(sceneId: Long, frameIdx: Int, oid: Long, otype: String,
                            x: Double, y: Double, heading: Double, speed: Double)

/** World-generation parameters for one dataset flavour. */
final case class WorldParams(nScenes: Int, nFrames: Int, fps: Double, seed: Long,
                             grid: GridParams, flavour: String,
                             egoSpeed: Double = 8.0, nObjects: Int = 14,
                             camHeight: Double = 1.5,
                             fx: Double = 800, fy: Double = 800,
                             imgW: Int = 1600, imgH: Int = 900,
                             camPitch: Double = 0.0)

object WorldParams {
  /** nuScenes-lite: ego-vehicle front camera, 20 s at 12 fps (§7 dataset). */
  def nuscenes(nScenes: Int, seed: Long = 7): WorldParams =
    WorldParams(nScenes, nFrames = 240, fps = 12, seed = seed,
                grid = GridParams(), flavour = "nuscenes")

  /** jackson-lite: static traffic camera over an intersection, 5 s @ 30 fps
    * clips (VIVA's Jackson Square dataset).
    */
  def jackson(nClips: Int, seed: Long = 11): WorldParams =
    WorldParams(nClips, nFrames = 150, fps = 30, seed = seed,
                grid = GridParams(), flavour = "jackson",
                nObjects = 12, camHeight = 6.0, camPitch = 15.0)

  /** sky-lite: top-down aerial drone flight (SkyQuery's dataset): the
    * drone sweeps across the grid so a bike lane is visible in most but
    * not all frames.
    */
  def sky(nFlights: Int, seed: Long = 13): WorldParams =
    WorldParams(nFlights, nFrames = 300, fps = 12, seed = seed,
                grid = GridParams(bikeLaneEvery = 1), flavour = "sky",
                egoSpeed = 10.0, nObjects = 10, camHeight = 120.0,
                fx = 2000, fy = 2000, imgW = 1920, imgH = 1080, camPitch = 90.0)
}

/** Piecewise-linear path with arc-length lookup and corner-smoothed
  * heading (the ego camera path).
  */
final case class Path(points: Vector[Vec2]) {
  require(points.size >= 2, "path needs >= 2 points")
  private val cum: Vector[Double] =
    points.iterator.sliding(2).map { case Seq(a, b) => a.dist(b) }
      .scanLeft(0.0)(_ + _).toVector

  def length: Double = cum.last

  private def segmentAt(s: Double): Int = {
    val c = math.max(0.0, math.min(s, length))
    var i = cum.indexWhere(_ > c) - 1
    if (i < 0) i = if (c >= length) points.size - 2 else 0
    math.min(i, points.size - 2)
  }

  def posAt(s: Double): Vec2 = {
    val i  = segmentAt(s)
    val t0 = cum(i); val t1 = cum(i + 1)
    val f  = if (t1 - t0 < 1e-12) 0.0 else (math.max(0.0, math.min(s, length)) - t0) / (t1 - t0)
    points(i) + (points(i + 1) - points(i)) * f
  }

  def segHeading(i: Int): Double = Heading.ofVec(points(i + 1) - points(i))

  /** Heading at arc length s, blended over `smooth` metres around corners. */
  def headingAt(s: Double, smooth: Double = 4.0): Double = {
    val i = segmentAt(s)
    val h = segHeading(i)
    val toEnd   = cum(i + 1) - s
    val fromSt  = s - cum(i)
    if (toEnd < smooth && i + 2 < points.size) {
      val nh = segHeading(i + 1)
      Heading.canon(h + Heading.signedDelta(h, nh) * (1.0 - toEnd / smooth) * 0.5)
    } else if (fromSt < smooth && i > 0) {
      val ph = segHeading(i - 1)
      Heading.canon(h - Heading.signedDelta(ph, h) * (1.0 - fromSt / smooth) * 0.5)
    } else h
  }
}

/** Deterministic per-scene generator. Builds the ego camera trajectory on
  * the road grid and a cast of movable objects whose behaviours cover all
  * Table-1 query scenarios (same-lane followers, oncoming traffic,
  * crossing cars, left-turners, stopped cars in bike lanes, crossing
  * pedestrians, bicycles, static barriers).
  */
object SceneGen {

  /** Object type mix calibrated to the paper's §7.2.1 prune fractions:
    * cars+trucks ≈ 63.5 % of detections (OTP prunes 36.5 %), pedestrians
    * ≈ 13.7 % (OTP prunes 86.3 % when only pedestrians are of interest).
    */
  private val TypeMix: Vector[(String, Double)] = Vector(
    "car" -> 0.50, "truck" -> 0.135, "pedestrian" -> 0.137, "bicycle" -> 0.12, "barrier" -> 0.108)

  private def pickType(u: Double): String = {
    var acc = 0.0
    TypeMix.foreach { case (t, p) => acc += p; if (u < acc) return t }
    TypeMix.last._1
  }

  private val Dirs = Vector(0.0, 90.0, 180.0, 270.0) // E N W S

  /** Lane centerline lateral offset (perpendicular-left of travel) for a
    * vehicle driving with heading `dirDeg` under right-hand traffic.
    */
  private def centerlineOffset(dirDeg: Double, lw: Double): Vec2 =
    Heading.toUnit(dirDeg).perp * (-lw / 2.0)

  /** Ego path: a lane-centerline polyline through the grid with seeded
    * turns at intersections (straight 50 %, left/right 25 % each, never
    * leaving the grid).
    */
  /** A quarter of the ego scenes drive against the lane direction (the
    * wrong-way scenario Q3 looks for: `opposite(lane, camera)`).
    */
  def egoWrongWay(p: WorldParams, sceneId: Long): Boolean =
    p.flavour == "nuscenes" && Rng.hash01(p.seed, sceneId, 6L) < 0.25

  def egoPath(p: WorldParams, sceneId: Long): Path = {
    val sp  = p.grid.spacing
    val lw  = p.grid.laneWidth
    val side = if (egoWrongWay(p, sceneId)) -1.0 else 1.0
    val need = p.egoSpeed * p.nFrames / p.fps + 2 * sp
    var ci = 1 + Rng.hashInt(math.max(1, p.grid.nx - 2), p.seed, sceneId, 1L)
    var cj = 1 + Rng.hashInt(math.max(1, p.grid.ny - 2), p.seed, sceneId, 2L)
    var dir = Dirs(Rng.hashInt(4, p.seed, sceneId, 3L))
    val pts = Vector.newBuilder[Vec2]
    // Start mid-block, approaching intersection (ci, cj) on dir's lane.
    val off0 = centerlineOffset(dir, lw) * side
    pts += Vec2(ci * sp, cj * sp) + off0 - Heading.toUnit(dir) * (sp / 2.0)
    var len  = 0.0
    var k    = 0
    var prev = Vec2(ci * sp, cj * sp) + off0 - Heading.toUnit(dir) * (sp / 2.0)
    while (len < need && k < 64) {
      // Choose outgoing direction at intersection (ci, cj).
      val candidates = Dirs.filter { d =>
        val u = Heading.toUnit(d)
        val (ni, nj) = (ci + math.round(u.x).toInt, cj + math.round(u.y).toInt)
        Heading.diff(d, dir) < 179.0 && ni >= 0 && ni < p.grid.nx && nj >= 0 && nj < p.grid.ny
      }
      val straightOk = candidates.contains(dir)
      val u = Rng.hash01(p.seed, sceneId, 4L, k.toLong)
      val out =
        if (straightOk && (u < 0.5 || candidates.size == 1)) dir
        else {
          val turns = candidates.filterNot(_ == dir)
          if (turns.isEmpty) dir else turns(Rng.hashInt(turns.size, p.seed, sceneId, 5L, k.toLong))
        }
      // Corner waypoint: incoming lane's lateral + outgoing lane's lateral.
      val inOff  = centerlineOffset(dir, lw) * side
      val outOff = centerlineOffset(out, lw) * side
      val wp = Vec2(
        ci * sp + (if (out == 90.0 || out == 270.0) outOff.x else if (dir == 90.0 || dir == 270.0) inOff.x else 0.0),
        cj * sp + (if (out == 0.0 || out == 180.0) outOff.y else if (dir == 0.0 || dir == 180.0) inOff.y else 0.0),
      )
      pts += wp
      len += prev.dist(wp)
      prev = wp
      dir = out
      val uv = Heading.toUnit(dir)
      ci += math.round(uv.x).toInt
      cj += math.round(uv.y).toInt
      k += 1
    }
    // Final leg to the last intersection center region.
    pts += prev + Heading.toUnit(dir) * sp
    Path(pts.result())
  }

  /** Straight north-south sweep for the aerial drone. */
  private def skyPath(p: WorldParams, sceneId: Long): Path = {
    val sp = p.grid.spacing
    val x  = sp * (1 + Rng.hashInt(math.max(1, p.grid.nx - 2), p.seed, sceneId, 21L)) + sp / 2.0
    val y0 = -sp / 4.0
    val y1 = y0 + p.egoSpeed * p.nFrames / p.fps + sp / 2.0
    Path(Vector(Vec2(x, y0), Vec2(x, y1)))
  }

  /** Camera frames for one scene. */
  def frames(p: WorldParams, sceneId: Long): Vector[FrameRow] = {
    val dt = 1.0 / p.fps
    p.flavour match {
      case "jackson" =>
        // Static camera at a corner of the central intersection, aimed at it.
        val sp = p.grid.spacing
        val c  = Vec2(2 * sp, 2 * sp)
        val camPos = c + Vec2(-18, -18)
        val yaw = Heading.ofVec(c - camPos)
        (0 until p.nFrames).map { f =>
          FrameRow(sceneId, f, f * dt, camPos.x, camPos.y, p.camHeight, yaw, p.camPitch,
                   p.fx, p.fy, 0.0, p.imgW / 2.0, p.imgH / 2.0, p.imgW, p.imgH)
        }.toVector
      case "sky" =>
        val path = skyPath(p, sceneId)
        (0 until p.nFrames).map { f =>
          val s   = p.egoSpeed * f * dt
          val pos = path.posAt(s)
          FrameRow(sceneId, f, f * dt, pos.x, pos.y, p.camHeight, 90.0, p.camPitch,
                   p.fx, p.fy, 0.0, p.imgW / 2.0, p.imgH / 2.0, p.imgW, p.imgH)
        }.toVector
      case _ =>
        val path = egoPath(p, sceneId)
        (0 until p.nFrames).map { f =>
          val s   = p.egoSpeed * f * dt
          val pos = path.posAt(s)
          FrameRow(sceneId, f, f * dt, pos.x, pos.y, p.camHeight, path.headingAt(s), p.camPitch,
                   p.fx, p.fy, 0.0, p.imgW / 2.0, p.imgH / 2.0, p.imgW, p.imgH)
        }.toVector
    }
  }

  /** Behaviour spec for one ground-truth object. */
  private final case class ObjSpec(oid: Long, otype: String, anchorFrame: Int,
                                   pos0: Vec2, heading0: Double, speed: Double,
                                   turnStart: Int = -1, turnDur: Int = 0, turnRateDps: Double = 0.0)

  private def nearestIntersectionAhead(p: WorldParams, pos: Vec2, dirDeg: Double): Vec2 = {
    val sp = p.grid.spacing
    val u  = Heading.toUnit(dirDeg)
    val ahead = pos + u * (sp / 2.0)
    Vec2(math.max(0, math.min(p.grid.nx - 1, math.round(ahead.x / sp))) * sp,
         math.max(0, math.min(p.grid.ny - 1, math.round(ahead.y / sp))) * sp)
  }

  /** A stopped car parked inside the nearest bike-lane segment (the Q10
    * target); falls back to the road edge when the network has no bike
    * lanes.
    */
  private def stoppedCar(oid: Long, f0: Int, anchor: Vec2, egoH: Double,
                         net: RoadNetwork, lw: Double): ObjSpec = {
    val bikes = net.ofType("bikeLane")
    if (bikes.nonEmpty) {
      def projected(b: RoadSegment): Vec2 = Vec2(
        math.max(b.polygon.minX + 1.0, math.min(b.polygon.maxX - 1.0, anchor.x)),
        math.max(b.polygon.minY + 0.3, math.min(b.polygon.maxY - 0.3, anchor.y)))
      val best = bikes.minBy(b => projected(b).dist(anchor))
      ObjSpec(oid, "car", f0, projected(best), best.heading.getOrElse(0.0), 0.0)
    } else
      ObjSpec(oid, "car", f0,
              anchor + Heading.toUnit(egoH) * 15.0 + Heading.toUnit(egoH).perp * lw, egoH, 0.0)
  }

  private def specs(p: WorldParams, sceneId: Long, net: RoadNetwork,
                    frameRows: Vector[FrameRow]): Vector[ObjSpec] = {
    val lw = p.grid.laneWidth
    (0 until p.nObjects).map { k =>
      val oid   = sceneId * 10000L + k
      val otype = pickType(Rng.hash01(p.seed, sceneId, 31L, k.toLong))
      val f0    = ((k + 0.5) * p.nFrames / p.nObjects).toInt min (p.nFrames - 1)
      val ego   = frameRows(f0)
      val egoP  = Vec2(ego.camX, ego.camY)
      val egoH  = if (p.flavour == "jackson" || p.flavour == "sky") Dirs(Rng.hashInt(4, p.seed, sceneId, 32L, k.toLong)) else ego.camYaw
      val egoDir = Heading.toUnit(egoH)
      val left   = egoDir.perp
      val ahead  = Rng.hashIn(10, 42, p.seed, sceneId, 33L, k.toLong)
      val anchor = p.flavour match {
        case "jackson" => Vec2(2 * p.grid.spacing, 2 * p.grid.spacing) // the watched intersection
        case "sky"     => egoP + Vec2(Rng.hashIn(-30, 30, p.seed, sceneId, 34L, k.toLong),
                                      Rng.hashIn(-20, 20, p.seed, sceneId, 35L, k.toLong))
        case _         => egoP
      }
      val inter = nearestIntersectionAhead(p, anchor, egoH)
      val role  = Rng.hash01(p.seed, sceneId, 36L, k.toLong)
      // The aerial workload's query (Q10) is about stopped cars in bike
      // lanes — guarantee one per flight.
      def laneHeadingAt(pos: Vec2, fallback: Double): Double =
        net.laneAt(pos).flatMap(_.heading).getOrElse(fallback)
      if (p.flavour == "sky" && k == 0) stoppedCar(oid, f0, anchor, egoH, net, lw)
      else if (p.flavour == "nuscenes" && egoWrongWay(p, sceneId) && k == 1) {
        // Q3's target: a car ahead in the wrong-way ego's lane, following
        // the lane's traffic direction (i.e. head-on toward the camera).
        val pos = anchor + egoDir * 35.0
        ObjSpec(oid, "car", f0, pos, laneHeadingAt(pos, Heading.canon(egoH + 180.0)), 8.0)
      }
      else otype match {
        case "car" | "truck" =>
          if (role < 0.25) { // in the ego's lane ahead, following the lane
            // (in wrong-way ego scenes this yields Q3's oncoming-in-lane car)
            val pos = anchor + egoDir * ahead
            ObjSpec(oid, otype, f0, pos, laneHeadingAt(pos, egoH),
                    Rng.hashIn(6.0, 9.5, p.seed, sceneId, 37L, k.toLong))
          } else if (role < 0.55) { // on the adjacent lane, following it
            val pos = anchor + egoDir * (ahead + 10) + left * lw
            ObjSpec(oid, otype, f0, pos,
                    laneHeadingAt(pos, Heading.canon(egoH + 180.0)), 8.0)
          }
          else if (role < 0.72) { // crossing the intersection ahead
            val cross = Heading.canon(egoH + (if (role < 0.635) 90.0 else 270.0))
            val cu    = Heading.toUnit(cross)
            ObjSpec(oid, otype, f0, inter + centerlineOffset(cross, lw) - cu * 18.0, cross, 8.0)
          } else if (role < 0.85) { // left-turner at the intersection ahead (Q9)
            val d0 = 22.0
            val framesToCenter = (d0 / 8.0 * p.fps).toInt
            ObjSpec(oid, otype, f0, inter + centerlineOffset(egoH, lw) - egoDir * d0, egoH, 8.0,
                    turnStart = f0 + framesToCenter - (p.fps / 2).toInt,
                    turnDur = (2.0 * p.fps).toInt, turnRateDps = 45.0)
          } else // stopped car, parked in the nearest bike lane (Q10)
            stoppedCar(oid, f0, anchor + egoDir * ahead, egoH, net, lw).copy(otype = otype)
        case "pedestrian" => // crossing at the intersection, perpendicular to ego (Q1)
          val cross = Heading.canon(egoH + (if (role < 0.5) 90.0 else 270.0))
          ObjSpec(oid, otype, f0, inter - Heading.toUnit(cross) * 4.0 + egoDir * 1.0, cross, 1.4)
        case "bicycle" =>
          ObjSpec(oid, otype, f0, anchor + egoDir * ahead + left * (lw + 0.75), egoH, 4.0)
        case _ => // barrier: static roadside clutter
          ObjSpec(oid, otype, f0, anchor + egoDir * ahead - left * (lw + 1.0), egoH, 0.0)
      }
    }.toVector
  }

  /** Integrate one object's spec into per-frame ground-truth states. */
  private def integrate(spec: ObjSpec, nFrames: Int, fps: Double, sceneId: Long): Vector[GtStateRow] = {
    val dt  = 1.0 / fps
    val out = Vector.newBuilder[GtStateRow]
    // Backward extrapolation keeps motion linear before the anchor frame.
    var pos = spec.pos0 - Heading.toUnit(spec.heading0) * (spec.speed * spec.anchorFrame * dt)
    var h   = spec.heading0
    var f   = 0
    while (f < nFrames) {
      out += GtStateRow(sceneId, f, spec.oid, spec.otype, pos.x, pos.y, h, spec.speed)
      if (spec.turnStart >= 0 && f >= spec.turnStart && f < spec.turnStart + spec.turnDur)
        h = Heading.canon(h + spec.turnRateDps * dt)
      pos = pos + Heading.toUnit(h) * (spec.speed * dt)
      f += 1
    }
    out.result()
  }

  /** Ground-truth object states for one scene. */
  def states(p: WorldParams, sceneId: Long): Vector[GtStateRow] = {
    val net = RoadNetwork.grid(p.grid)
    val frs = frames(p, sceneId)
    specs(p, sceneId, net, frs).flatMap(integrate(_, p.nFrames, p.fps, sceneId))
  }
}

/** Spark-side dataset builders: scene-parallel, deterministic in
  * (params, seed).
  */
object WorldGen {

  def frames(spark: SparkSession, p: WorldParams): DataFrame = {
    import spark.implicits._
    spark.range(p.nScenes).as[Long].flatMap(sid => SceneGen.frames(p, sid)).toDF()
  }

  def gtStates(spark: SparkSession, p: WorldParams): DataFrame = {
    import spark.implicits._
    spark.range(p.nScenes).as[Long].flatMap(sid => SceneGen.states(p, sid)).toDF()
  }

  def roadNetwork(p: WorldParams): RoadNetwork = RoadNetwork.grid(p.grid)
}
