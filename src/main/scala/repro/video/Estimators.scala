package repro.video

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import repro.geom._

/** A detection with an estimated 3D (ground-plane) location.
  * `method` records which estimator produced it: "ml" (Monodepth2 stand-in),
  * "geom" (§6.3 ray–ground intersection) or "geom_fallback" (geometry
  * failed — ray above horizon — and the ML path was used, §6.3.3).
  */
final case class Det3dRow(sceneId: Long, frameIdx: Int, did: Long, oid: Long, otype: String,
                          x1: Double, y1: Double, x2: Double, y2: Double,
                          zc: Double, gtX: Double, gtY: Double,
                          camX: Double, camY: Double, camZ: Double,
                          camYaw: Double, camPitch: Double,
                          fx: Double, fy: Double, skew: Double, px0: Double, py0: Double,
                          imgW: Int, imgH: Int,
                          estX: Double, estY: Double, method: String) {
  def pose: CamPose          = CamPose(camX, camY, camZ, camYaw, camPitch)
  def intrinsics: Intrinsics = Intrinsics(fx, fy, skew, px0, py0, imgW, imgH)
}

/** 3D location estimators (paper §5.2.2 op (3) and §6.3). */
object Estimators {

  /** Relative depth error of the simulated monocular-depth model. */
  val MlDepthNoise = 0.05

  private def withEst(d: DetRow, estX: Double, estY: Double, method: String): Det3dRow =
    Det3dRow(d.sceneId, d.frameIdx, d.did, d.oid, d.otype, d.x1, d.y1, d.x2, d.y2,
             d.zc, d.gtX, d.gtY, d.camX, d.camY, d.camZ, d.camYaw, d.camPitch,
             d.fx, d.fy, d.skew, d.px0, d.py0, d.imgW, d.imgH, estX, estY, method)

  /** Monodepth2 stand-in: true depth perturbed by deterministic noise,
    * placed along the pixel ray through the bbox bottom-center.
    */
  def mlOne(d: DetRow, seed: Long = 211): Det3dRow = {
    val noise = 1.0 + (Rng.hash01(seed, d.sceneId, d.frameIdx.toLong, d.did) * 2 - 1) * MlDepthNoise
    val p     = CameraModel.pixelAtDepth(d.pose, d.intrinsics, d.bottomCenterX, d.y2, d.zc * noise)
    withEst(d, p.x, p.y, "ml")
  }

  /** Geometry-based estimator (§6.3.2): intersect the ray through the bbox
    * bottom-center with the ground plane z=0; fall back to the ML path if
    * the solution is behind the camera / above the horizon (§6.3.3).
    */
  def geomOne(d: DetRow, seed: Long = 211): Det3dRow =
    CameraModel.pixelToGround(d.pose, d.intrinsics, d.bottomCenterX, d.y2) match {
      case Some(p) => withEst(d, p.x, p.y, "geom")
      case None    => mlOne(d, seed).copy(method = "geom_fallback")
    }

  def ml(spark: SparkSession, dets: DataFrame, seed: Long = 211): DataFrame = {
    import spark.implicits._
    dets.as[DetRow].map(mlOne(_, seed)).toDF()
  }

  def geometry(spark: SparkSession, dets: DataFrame, seed: Long = 211): DataFrame = {
    import spark.implicits._
    dets.as[DetRow].map(geomOne(_, seed)).toDF()
  }
}
