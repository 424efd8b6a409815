package repro.geom

/** Unit quaternion for 3D rotations (paper §4.1.3 stores camera rotation
  * as a quaternion). We mostly construct from yaw/pitch and convert to a
  * rotation matrix for the camera extrinsics (Eq. 4).
  */
final case class Quaternion(w: Double, x: Double, y: Double, z: Double) {
  def norm: Double = math.sqrt(w * w + x * x + y * y + z * z)

  def normalized: Quaternion = {
    val n = norm
    require(n > 1e-12, "cannot normalize zero quaternion")
    Quaternion(w / n, x / n, y / n, z / n)
  }

  def conjugate: Quaternion = Quaternion(w, -x, -y, -z)

  def *(o: Quaternion): Quaternion = Quaternion(
    w * o.w - x * o.x - y * o.y - z * o.z,
    w * o.x + x * o.w + y * o.z - z * o.y,
    w * o.y - x * o.z + y * o.w + z * o.x,
    w * o.z + x * o.y - y * o.x + z * o.w,
  )

  /** Rotate a vector by this (unit) quaternion. */
  def rotate(v: Vec3): Vec3 = {
    val qv  = Quaternion(0, v.x, v.y, v.z)
    val out = this * qv * conjugate
    Vec3(out.x, out.y, out.z)
  }

  /** 3x3 rotation matrix, rows as Vec3 (matrix acting on column vectors). */
  def toMatrixRows: (Vec3, Vec3, Vec3) = {
    val (ww, xx, yy, zz) = (w * w, x * x, y * y, z * z)
    (
      Vec3(ww + xx - yy - zz, 2 * (x * y - w * z), 2 * (x * z + w * y)),
      Vec3(2 * (x * y + w * z), ww - xx + yy - zz, 2 * (y * z - w * x)),
      Vec3(2 * (x * z - w * y), 2 * (y * z + w * x), ww - xx - yy + zz),
    )
  }

  /** Yaw (rotation about world z) recovered from the quaternion, degrees. */
  def yawDeg: Double = {
    val siny = 2.0 * (w * z + x * y)
    val cosy = 1.0 - 2.0 * (y * y + z * z)
    Heading.canon(math.toDegrees(math.atan2(siny, cosy)))
  }
}

object Quaternion {
  val identity: Quaternion = Quaternion(1, 0, 0, 0)

  /** Rotation of `deg` degrees about `axis` (right-hand rule). */
  def axisAngle(axis: Vec3, deg: Double): Quaternion = {
    val a = axis.normalized
    val h = math.toRadians(deg) / 2.0
    Quaternion(math.cos(h), a.x * math.sin(h), a.y * math.sin(h), a.z * math.sin(h))
  }

  /** Yaw about world z axis (CCW from +x), degrees. */
  def fromYawDeg(deg: Double): Quaternion = axisAngle(Vec3(0, 0, 1), deg)
}
