package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.geom.{CameraModel, Heading, Vec2}
import repro.video.Det3dRow
import repro.world.{FrameRow, RoadNetwork, RoadSegment}

/** A frame selected by the Exit Frame Sampler for the tracker to process. */
final case class SampledFrame(sceneId: Long, frameIdx: Int)

/** Exit Frame Sampler (§6.4): between the 3D estimator and the tracker,
  * sample only the frames where a `sampleEvent` may occur —
  * (i) a car exits its lane, (ii) a car exits the camera view, (iii) a
  * new car enters the view — predicting car motion from the lane's
  * traffic heading at the assumed regulatory speed (25 mph). Cars inside
  * an intersection cannot be predicted, so no frame is skipped there.
  *
  * The maximum skip distance is 13 frames — the accuracy/runtime knee of
  * Fig. 4(c).
  */
object ExitFrameSampler {

  /** 25 mph, the assumed common-traffic-rule speed of §6.4.2. */
  val AssumedSpeedMps = 11.18

  val DefaultMaxSkip = 13

  /** Visibility distance used for the exitsCamera event. */
  val ViewDistance = 120.0

  /** Sample one scene. `frames` is the (RVP-surviving) frame stream in
    * order; `detsByFrame` the (OTP-surviving) located detections. Returns
    * the sampled frame indices, always including the first frame.
    * Positions are in *stream* order — skips count frames the tracker
    * would otherwise process.
    */
  def sampleScene(frames: Vector[FrameRow], detsByFrame: Map[Int, Seq[Det3dRow]],
                  lanes: Array[RoadSegment], intersections: Array[RoadSegment],
                  fps: Double, maxSkip: Int = DefaultMaxSkip,
                  speed: Double = AssumedSpeedMps): Vector[Int] = {
    if (frames.isEmpty) return Vector.empty
    val n    = frames.size
    def nDets(pos: Int): Int = detsByFrame.get(frames(pos).frameIdx).map(_.size).getOrElse(0)

    val out = Vector.newBuilder[Int]
    var i   = 0
    out += frames(0).frameIdx
    while (i < n - 1) {
      val cap  = math.min(n - 1, i + 1 + maxSkip)
      val cur  = frames(i)
      val dets = detsByFrame.getOrElse(cur.frameIdx, Seq.empty)
      var next = cap

      // (iii) newCar: the first upcoming frame with a detection that no
      // currently-visible car could have produced (further than any of
      // them could travel at the assumed speed, plus a slack radius) —
      // raw detection *counts* flicker with detector misses.
      val curPos = dets.map(d => Vec2(d.estX, d.estY))
      var j = i + 1
      var newCarAt = -1
      while (j <= cap && newCarAt < 0) {
        val f     = frames(j)
        val reach = speed * (f.frameIdx - cur.frameIdx) / fps + 8.0
        val cand  = detsByFrame.getOrElse(f.frameIdx, Seq.empty)
        if (cand.exists(d => curPos.forall(p => p.dist(Vec2(d.estX, d.estY)) > reach)))
          newCarAt = j
        j += 1
      }
      if (newCarAt >= 0) next = math.min(next, newCarAt)

      dets.foreach { d =>
        val p = Vec2(d.estX, d.estY)
        if (intersections.exists(_.polygon.contains(p))) {
          // In an intersection the car may not travel straight: no skipping.
          next = i + 1
        } else {
          lanes.find(l => l.heading.isDefined && l.polygon.contains(p)) match {
            case Some(lane) =>
              val dir = Heading.toUnit(lane.heading.get)
              // (i) exitsLane: last frame strictly before the car reaches
              // the lane-polygon boundary along the lane direction.
              lane.polygon.rayExitDistance(p, dir).foreach { exitDist =>
                val exitFrame = cur.frameIdx + exitDist / speed * fps
                var k = i + 1
                var lastBefore = i + 1
                while (k <= cap && frames(k).frameIdx < exitFrame) { lastBefore = k; k += 1 }
                if (k <= cap || frames(cap).frameIdx >= exitFrame)
                  next = math.min(next, math.max(i + 1, lastBefore))
              }
              // (ii) exitsCamera: the frame preceding the first predicted
              // position outside the camera view.
              var k = i + 1
              var exited = -1
              while (k <= cap && exited < 0) {
                val f    = frames(k)
                val pred = p + dir * (speed * (f.frameIdx - cur.frameIdx) / fps)
                if (!CameraModel.seesGroundPoint(f.pose, f.intrinsics, pred, ViewDistance))
                  exited = k
                k += 1
              }
              if (exited >= 0) next = math.min(next, math.max(i + 1, exited - 1))
            case None =>
              // Not on any lane: motion unpredictable, no skipping.
              next = i + 1
          }
        }
      }

      next = math.max(i + 1, math.min(next, cap))
      out += frames(next).frameIdx
      i = next
    }
    out.result()
  }

  /** Scene-parallel sampling over DataFrames. Returns (sceneId, frameIdx)
    * rows of sampled frames.
    */
  def sample(spark: SparkSession, frames: DataFrame, dets3d: DataFrame, net: RoadNetwork,
             fps: Double, maxSkip: Int = DefaultMaxSkip): DataFrame = {
    import spark.implicits._
    val lanes         = net.segments.filter(s => s.heading.isDefined).toArray
    val intersections = net.ofType("intersection").toArray
    frames.as[FrameRow]
      .groupByKey(_.sceneId)
      .cogroup(dets3d.as[Det3dRow].groupByKey(_.sceneId)) { (sid, fIt, dIt) =>
        val frs     = fIt.toVector.sortBy(_.frameIdx)
        val byFrame = dIt.toVector.groupBy(_.frameIdx): Map[Int, Seq[Det3dRow]]
        sampleScene(frs, byFrame, lanes, intersections, fps, maxSkip)
          .iterator.map(f => SampledFrame(sid, f))
      }
      .toDF()
  }
}
