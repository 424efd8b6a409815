package repro.video

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.geom._

/** A 2D object detection with its camera context. `zc`, `gtX`, `gtY` and
  * `oid` are latent ground truth carried for the depth simulator and the
  * accuracy metrics — Spatialyze operators only consume the bbox, the
  * type, and the camera metadata.
  */
final case class DetRow(sceneId: Long, frameIdx: Int, did: Long, oid: Long, otype: String,
                        x1: Double, y1: Double, x2: Double, y2: Double,
                        zc: Double, gtX: Double, gtY: Double,
                        camX: Double, camY: Double, camZ: Double,
                        camYaw: Double, camPitch: Double,
                        fx: Double, fy: Double, skew: Double, px0: Double, py0: Double,
                        imgW: Int, imgH: Int) {
  def pose: CamPose          = CamPose(camX, camY, camZ, camYaw, camPitch)
  def intrinsics: Intrinsics = Intrinsics(fx, fy, skew, px0, py0, imgW, imgH)
  def bottomCenterX: Double  = (x1 + x2) / 2.0
}

/** DetRow fields + the ground-truth state fields, the shape of
  * frames ⋈ gtStates used internally by the detector.
  */
private[video] final case class StateFrame(sceneId: Long, frameIdx: Int, ts: Double,
                                           camX: Double, camY: Double, camZ: Double,
                                           camYaw: Double, camPitch: Double,
                                           fx: Double, fy: Double, skew: Double,
                                           px0: Double, py0: Double, imgW: Int, imgH: Int,
                                           oid: Long, otype: String,
                                           x: Double, y: Double, heading: Double, speed: Double)

/** Simulated object detector (stands in for YOLOv5, see DESIGN.md §2).
  *
  * Projects ground-truth objects into the camera; visible objects are
  * emitted as 2D bounding boxes whose bottom-center pixel is the object's
  * true ground-contact point (+ sub-pixel jitter), matching the §6.3
  * assumption the geometry-based estimator relies on. Misses are
  * deterministic hash draws so every plan sees identical detections.
  */
object SimDetector {

  /** (visual half-width, height) in metres per object type. */
  val Dims: Map[String, (Double, Double)] = Map(
    "car" -> (1.1, 1.55), "truck" -> (1.4, 3.0), "pedestrian" -> (0.35, 1.7),
    "bicycle" -> (0.5, 1.6), "barrier" -> (1.0, 1.0),
  )

  val MaxDetectDistance = 130.0

  private def detectProb(zc: Double): Double =
    if (zc < 40) 0.98 else if (zc < 80) 0.90 else 0.78

  /** Detect one joined (frame, ground-truth state) row. */
  def detectOne(s: StateFrame, seed: Long): Option[DetRow] = {
    val pose = CamPose(s.camX, s.camY, s.camZ, s.camYaw, s.camPitch)
    val it   = Intrinsics(s.fx, s.fy, s.skew, s.px0, s.py0, s.imgW, s.imgH)
    CameraModel.worldToPixel(pose, it, Vec3(s.x, s.y, 0.0)).flatMap { case (xp0, yp0, zc) =>
      if (zc < 2.0 || zc > MaxDetectDistance || !CameraModel.inImage(it, xp0, yp0)) None
      else if (Rng.hash01(seed, s.sceneId, s.frameIdx.toLong, s.oid) >= detectProb(zc)) None
      else {
        val (halfW, objH) = Dims.getOrElse(s.otype, (0.8, 1.5))
        // Sub-pixel measurement noise on the bbox bottom-center.
        val jx = (Rng.hash01(seed + 1, s.sceneId, s.frameIdx.toLong, s.oid) - 0.5)
        val jy = (Rng.hash01(seed + 2, s.sceneId, s.frameIdx.toLong, s.oid) - 0.5)
        val xp = xp0 + jx; val yp = yp0 + jy
        val wpx = s.fx * halfW / zc
        val hpx = s.fy * objH / zc
        val did = Rng.hashLong(s.sceneId, s.frameIdx.toLong, s.oid)
        Some(DetRow(s.sceneId, s.frameIdx, did, s.oid, s.otype,
                    xp - wpx, yp - hpx, xp + wpx, yp, zc, s.x, s.y,
                    s.camX, s.camY, s.camZ, s.camYaw, s.camPitch,
                    s.fx, s.fy, s.skew, s.px0, s.py0, s.imgW, s.imgH))
      }
    }
  }

  /** Run the detector over every (frame, object) pair of the given frames.
    * Cost accounting (one detector invocation per frame) happens in the
    * caller via frame counts — see CostModel.
    */
  def detect(spark: SparkSession, frames: DataFrame, gtStates: DataFrame, seed: Long = 101): DataFrame = {
    import spark.implicits._
    frames
      .join(gtStates, Seq("sceneId", "frameIdx"))
      .as[StateFrame]
      .flatMap(detectOne(_, seed))
      .toDF()
  }
}
