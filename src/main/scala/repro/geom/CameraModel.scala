package repro.geom

/** Camera intrinsics (paper Eq. 1): focal lengths, skew, optical center,
  * plus the image size in pixels.
  */
final case class Intrinsics(fx: Double, fy: Double, s: Double, x0: Double, y0: Double,
                            w: Int, h: Int)

/** Camera pose in the world coordinate system: position plus yaw/pitch.
  * Yaw is degrees CCW from +x; pitch is degrees of downward tilt
  * (pitch = 90 looks straight down — the SkyQuery aerial case).
  *
  * The camera coordinate system follows the paper's footnote 3: origin at
  * the camera, Z forward, X right, Y down.
  */
final case class CamPose(x: Double, y: Double, z: Double, yawDeg: Double, pitchDeg: Double = 0.0) {
  def pos: Vec3 = Vec3(x, y, z)
}

/** Pixel <-> camera <-> world conversions (paper §6.1.2 Eq. 1-6 and the
  * geometry-based 3D estimator of §6.3 Eq. 7).
  */
object CameraModel {

  /** Orthonormal camera axes in world coordinates: (right = X_cam,
    * down = Y_cam, forward = Z_cam). Columns of the rotation matrix R of
    * Eq. 4.
    */
  def axes(pose: CamPose): (Vec3, Vec3, Vec3) = {
    val yaw   = math.toRadians(pose.yawDeg)
    val pitch = math.toRadians(pose.pitchDeg)
    val fwd   = Vec3(math.cos(pitch) * math.cos(yaw), math.cos(pitch) * math.sin(yaw), -math.sin(pitch))
    // Right is horizontal (no roll); well-defined even looking straight down.
    val right = Vec3(math.sin(yaw), -math.cos(yaw), 0.0)
    val down  = fwd cross right
    (right, down.normalized, fwd)
  }

  /** World point -> camera coordinates (x right, y down, z forward). */
  def worldToCam(pose: CamPose, p: Vec3): Vec3 = {
    val (r, d, f) = axes(pose)
    val v         = p - pose.pos
    Vec3(v dot r, v dot d, v dot f)
  }

  /** Camera point -> world coordinates (inverse of worldToCam). */
  def camToWorld(pose: CamPose, pc: Vec3): Vec3 = {
    val (r, d, f) = axes(pose)
    pose.pos + r * pc.x + d * pc.y + f * pc.z
  }

  /** Project a world point to pixels; None when behind the camera.
    * Returns (xp, yp, zc) where zc is the depth along the optical axis.
    */
  def worldToPixel(pose: CamPose, it: Intrinsics, p: Vec3): Option[(Double, Double, Double)] = {
    val pc = worldToCam(pose, p)
    if (pc.z <= 1e-6) None
    else {
      val xp = it.fx * pc.x / pc.z + it.s * pc.y / pc.z + it.x0
      val yp = it.fy * pc.y / pc.z + it.y0
      Some((xp, yp, pc.z))
    }
  }

  def inImage(it: Intrinsics, xp: Double, yp: Double): Boolean =
    xp >= 0 && xp < it.w && yp >= 0 && yp < it.h

  /** World-space unit direction of the ray through pixel (xp, yp) (Eq. 5
    * with unknown depth — the "vector of possible 3D locations" of §6.3.2).
    */
  def pixelRay(pose: CamPose, it: Intrinsics, xp: Double, yp: Double): Vec3 = {
    val yc  = (yp - it.y0) / it.fy
    val xc  = (xp - it.x0 - it.s * yc) / it.fx
    val dir = camToWorld(pose, Vec3(xc, yc, 1.0)) - pose.pos
    dir.normalized
  }

  /** World point at camera-depth zc behind pixel (xp, yp) (Eq. 5). */
  def pixelAtDepth(pose: CamPose, it: Intrinsics, xp: Double, yp: Double, zc: Double): Vec3 = {
    val yc = (yp - it.y0) / it.fy
    val xc = (xp - it.x0 - it.s * yc) / it.fx
    camToWorld(pose, Vec3(xc * zc, yc * zc, zc))
  }

  /** Geometry-based 3D location (§6.3.2): intersect the pixel ray with the
    * ground plane z=0. None when the ray points at or above the horizon —
    * the paper's "estimated location behind the camera" fallback case.
    */
  def pixelToGround(pose: CamPose, it: Intrinsics, xp: Double, yp: Double): Option[Vec3] = {
    val dir = pixelRay(pose, it, xp, yp)
    if (dir.z >= -1e-9 || pose.z <= 0) None
    else {
      val t = -pose.z / dir.z
      if (t <= 0) None else Some(pose.pos + dir * t)
    }
  }

  /** The camera's viewable area on the ground plane at max distance d
    * (§6.1.2): convex hull of the camera position and the 4 frame corners
    * at depth d, all projected onto z=0 (Eq. 6 + Fig. 2).
    *
    * Corner rays that strike the ground before reaching depth d are
    * clamped at their ground intersection — projecting the below-ground
    * corner instead would overstate the visible footprint, grossly so for
    * downward-looking (aerial) cameras.
    */
  def viewHull(pose: CamPose, it: Intrinsics, d: Double): Polygon = {
    val corners = Seq((0.0, 0.0), (it.w.toDouble, 0.0), (it.w.toDouble, it.h.toDouble), (0.0, it.h.toDouble))
      .map { case (xp, yp) =>
        val atDepth = pixelAtDepth(pose, it, xp, yp, d)
        if (atDepth.z >= 0) atDepth.xy
        else pixelToGround(pose, it, xp, yp).map(_.xy).getOrElse(atDepth.xy)
      }
    Polygon.convexHull(pose.pos.xy +: corners)
  }

  /** Whether a ground point is inside the camera's view frustum (in image
    * and within depth d). Used by the Exit Frame Sampler's exitsCamera.
    */
  def seesGroundPoint(pose: CamPose, it: Intrinsics, p: Vec2, d: Double): Boolean =
    worldToPixel(pose, it, Vec3(p.x, p.y, 0.0)) match {
      case Some((xp, yp, zc)) => zc <= d && inImage(it, xp, yp)
      case None               => false
    }
}
