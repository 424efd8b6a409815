package repro.geom

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers

class CameraModelSpec extends AnyFunSuite with PropHelpers {

  private val it = Intrinsics(fx = 800, fy = 800, s = 0, x0 = 800, y0 = 450, w = 1600, h = 900)

  test("camera axes are orthonormal and right-handed") {
    forAllG2(Gen.choose(0.0, 360.0), Gen.choose(-89.0, 89.0)) { (yaw, pitch) =>
      val (r, d, f) = CameraModel.axes(CamPose(0, 0, 1.5, yaw, pitch))
      assert(math.abs(r.norm - 1) < 1e-9 && math.abs(d.norm - 1) < 1e-9 && math.abs(f.norm - 1) < 1e-9)
      assert(math.abs(r dot d) < 1e-9 && math.abs(r dot f) < 1e-9 && math.abs(d dot f) < 1e-9)
      assert(((r cross d) - f).norm < 1e-9, "x cross y = z (right-handed)")
    }
  }

  test("forward axis matches yaw for a level camera") {
    val (_, _, f) = CameraModel.axes(CamPose(0, 0, 1.5, 90.0))
    assert((f - Vec3(0, 1, 0)).norm < 1e-9)
  }

  test("down axis is straight down for a level camera (z-up world)") {
    val (_, d, _) = CameraModel.axes(CamPose(0, 0, 1.5, 33.0))
    assert((d - Vec3(0, 0, -1)).norm < 1e-9)
  }

  test("aerial camera (pitch 90) looks straight down") {
    val (_, _, f) = CameraModel.axes(CamPose(0, 0, 120, 90.0, 90.0))
    assert((f - Vec3(0, 0, -1)).norm < 1e-9)
  }

  test("worldToCam/camToWorld round trip") {
    val poseG = Gen.zip(Gen.choose(-100.0, 100.0), Gen.choose(-100.0, 100.0),
                        Gen.choose(0.0, 360.0), Gen.choose(-45.0, 45.0))
    val ptG = Gen.zip(Gen.choose(-200.0, 200.0), Gen.choose(-200.0, 200.0), Gen.choose(-10.0, 10.0))
    forAllG2(poseG, ptG) { case ((x, y, yaw, pitch), (px, py, pz)) =>
      val pose = CamPose(x, y, 1.5, yaw, pitch)
      val p    = Vec3(px, py, pz)
      val back = CameraModel.camToWorld(pose, CameraModel.worldToCam(pose, p))
      assert((back - p).norm < 1e-8, s"round trip drift ${(back - p).norm}")
    }
  }

  test("a point straight ahead projects to the optical center") {
    val pose = CamPose(0, 0, 1.5, 0.0)
    val Some((xp, yp, zc)) = CameraModel.worldToPixel(pose, it, Vec3(20, 0, 1.5))
    assert(math.abs(xp - it.x0) < 1e-9)
    assert(math.abs(yp - it.y0) < 1e-9)
    assert(math.abs(zc - 20.0) < 1e-9)
  }

  test("points behind the camera do not project") {
    val pose = CamPose(0, 0, 1.5, 0.0)
    assert(CameraModel.worldToPixel(pose, it, Vec3(-5, 0, 1.5)).isEmpty)
  }

  test("a ground point ahead projects below the optical center") {
    val pose = CamPose(0, 0, 1.5, 0.0)
    val Some((_, yp, _)) = CameraModel.worldToPixel(pose, it, Vec3(20, 0, 0))
    assert(yp > it.y0, "ground is below the horizon")
  }

  test("projection/pixelAtDepth round trip (Eq. 1-5)") {
    val poseG = Gen.zip(Gen.choose(-50.0, 50.0), Gen.choose(-50.0, 50.0), Gen.choose(0.0, 360.0))
    forAllG2(poseG, Gen.zip(Gen.choose(5.0, 80.0), Gen.choose(-20.0, 20.0), Gen.choose(0.0, 3.0))) {
      case ((cx, cy, yaw), (fwd, lat, z)) =>
        val pose = CamPose(cx, cy, 1.5, yaw)
        val (r, _, f) = CameraModel.axes(pose)
        val p = pose.pos + f * fwd + r * lat + Vec3(0, 0, z - 1.5)
        CameraModel.worldToPixel(pose, it, p).foreach { case (xp, yp, zc) =>
          val back = CameraModel.pixelAtDepth(pose, it, xp, yp, zc)
          assert((back - p).norm < 1e-6, s"pixelAtDepth drift ${(back - p).norm}")
        }
    }
  }

  test("pixelToGround inverts the projection of ground points (Eq. 7, geometry estimator)") {
    val poseG = Gen.zip(Gen.choose(-50.0, 50.0), Gen.choose(-50.0, 50.0), Gen.choose(0.0, 360.0))
    val gG    = Gen.zip(Gen.choose(5.0, 100.0), Gen.choose(-25.0, 25.0))
    forAllG2(poseG, gG) { case ((cx, cy, yaw), (fwd, lat)) =>
      val pose = CamPose(cx, cy, 1.5, yaw)
      val (r, _, f) = CameraModel.axes(pose)
      val gxy = (pose.pos + f * fwd + r * lat).xy
      val g   = Vec3(gxy.x, gxy.y, 0.0)
      CameraModel.worldToPixel(pose, it, g).foreach { case (xp, yp, _) =>
        if (CameraModel.inImage(it, xp, yp)) {
          val est = CameraModel.pixelToGround(pose, it, xp, yp)
          assert(est.isDefined)
          assert((est.get - g).norm < 1e-6, s"ground intersection drift ${(est.get - g).norm}")
        }
      }
    }
  }

  test("pixelToGround is None above the horizon (the §6.3.3 fallback case)") {
    val pose = CamPose(0, 0, 1.5, 0.0)
    assert(CameraModel.pixelToGround(pose, it, 800, 100).isEmpty, "pixel above optical center")
    assert(CameraModel.pixelToGround(pose, it, 800, 450).isEmpty, "horizon pixel")
    assert(CameraModel.pixelToGround(pose, it, 800, 500).isDefined, "below horizon")
  }

  test("view hull contains visible ground points and the camera position") {
    val pose = CamPose(10, 20, 1.5, 45.0)
    val hull = CameraModel.viewHull(pose, it, 50.0)
    assert(hull.contains(pose.pos.xy))
    // A ground point 20 m ahead must be in the hull.
    val ahead = pose.pos.xy + Heading.toUnit(45.0) * 20.0
    assert(hull.contains(ahead))
    // A point behind the camera must not be.
    val behind = pose.pos.xy - Heading.toUnit(45.0) * 20.0
    assert(!hull.contains(behind))
  }

  test("every ground point the camera sees within d lies in the view hull") {
    val poseG = Gen.zip(Gen.choose(-50.0, 50.0), Gen.choose(-50.0, 50.0), Gen.choose(0.0, 360.0))
    val offG  = Gen.zip(Gen.choose(2.0, 49.0), Gen.choose(-30.0, 30.0))
    forAllG2(poseG, offG) { case ((cx, cy, yaw), (fwd, lat)) =>
      val pose = CamPose(cx, cy, 1.5, yaw)
      val (r, _, f) = CameraModel.axes(pose)
      val gxy = (pose.pos + f * fwd + r * lat).xy
      if (CameraModel.seesGroundPoint(pose, it, gxy, 50.0)) {
        val hull = CameraModel.viewHull(pose, it, 50.0)
        assert(hull.contains(gxy), s"seen point $gxy outside hull")
      }
    }
  }

  test("aerial view hull is a footprint around the camera") {
    val pose = CamPose(100, 100, 120, 90.0, 90.0)
    val sky  = Intrinsics(1800, 1800, 0, 960, 540, 1920, 1080)
    val hull = CameraModel.viewHull(pose, sky, 150.0)
    assert(hull.contains(Vec2(100, 100)))
    assert(hull.contains(Vec2(130, 100)), "within the ~64 m half-width footprint")
    assert(!hull.contains(Vec2(100, 250)), "beyond the footprint")
  }

  test("seesGroundPoint respects the distance bound") {
    val pose = CamPose(0, 0, 1.5, 0.0)
    assert(CameraModel.seesGroundPoint(pose, it, Vec2(30, 0), 50.0))
    assert(!CameraModel.seesGroundPoint(pose, it, Vec2(70, 0), 50.0), "beyond d")
    assert(!CameraModel.seesGroundPoint(pose, it, Vec2(-10, 0), 50.0), "behind")
  }
}
