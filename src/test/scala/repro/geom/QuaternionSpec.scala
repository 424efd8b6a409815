package repro.geom

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers

class QuaternionSpec extends AnyFunSuite with PropHelpers {

  test("identity rotates nothing") {
    val v = Vec3(1, 2, 3)
    assert((Quaternion.identity.rotate(v) - v).norm < 1e-12)
  }

  test("yaw quaternion rotates +x toward +y (CCW, z-up)") {
    val q = Quaternion.fromYawDeg(90)
    assert((q.rotate(Vec3(1, 0, 0)) - Vec3(0, 1, 0)).norm < 1e-9)
  }

  test("yawDeg round trip") {
    forAllG(Gen.choose(0.0, 359.0)) { deg =>
      assert(Heading.diff(Quaternion.fromYawDeg(deg).yawDeg, deg) < 1e-6)
    }
  }

  test("rotation preserves vector norm") {
    val axisG = Gen.zip(Gen.choose(-1.0, 1.0), Gen.choose(-1.0, 1.0), Gen.choose(-1.0, 1.0))
      .suchThat { case (x, y, z) => math.sqrt(x * x + y * y + z * z) > 1e-3 }
    forAllG3(axisG, Gen.choose(0.0, 360.0),
             Gen.zip(Gen.choose(-10.0, 10.0), Gen.choose(-10.0, 10.0), Gen.choose(-10.0, 10.0)),
             trials = 100) { case ((ax, ay, az), deg, (vx, vy, vz)) =>
      val q = Quaternion.axisAngle(Vec3(ax, ay, az), deg)
      val v = Vec3(vx, vy, vz)
      assert(math.abs(q.rotate(v).norm - v.norm) < 1e-8)
    }
  }

  test("composition: two 45-degree yaws equal one 90-degree yaw") {
    val q45 = Quaternion.fromYawDeg(45)
    val q90 = Quaternion.fromYawDeg(90)
    val v   = Vec3(3, -1, 2)
    assert(((q45 * q45).rotate(v) - q90.rotate(v)).norm < 1e-9)
  }

  test("conjugate inverts the rotation") {
    forAllG(Gen.choose(0.0, 360.0)) { deg =>
      val q = Quaternion.axisAngle(Vec3(1, 2, 3), deg)
      val v = Vec3(0.5, -2, 1)
      assert((q.conjugate.rotate(q.rotate(v)) - v).norm < 1e-8)
    }
  }

  test("toMatrixRows agrees with quaternion rotation") {
    forAllG2(Gen.choose(0.0, 360.0), Gen.choose(-80.0, 80.0)) { (yaw, pitch) =>
      val q = Quaternion.fromYawDeg(yaw) * Quaternion.axisAngle(Vec3(0, 1, 0), pitch)
      val (r0, r1, r2) = q.toMatrixRows
      val v = Vec3(1.5, -0.5, 2.0)
      val mv = Vec3(r0 dot v, r1 dot v, r2 dot v)
      assert((mv - q.rotate(v)).norm < 1e-8)
    }
  }

  test("normalized rejects the zero quaternion") {
    intercept[IllegalArgumentException] { Quaternion(0, 0, 0, 0).normalized }
  }
}
