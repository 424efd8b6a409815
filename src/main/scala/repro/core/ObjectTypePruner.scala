package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col

/** Object Type Pruner (§6.2): drop detections whose type the workflow
  * output cannot contain, before 3D estimation and tracking — the
  * Hungarian association cost scales with the number of objects per
  * frame, so pruning types directly shrinks the tracker's workload.
  */
object ObjectTypePruner {
  def prune(dets: DataFrame, typesOfInterest: Set[String]): DataFrame =
    dets.filter(col("otype").isin(typesOfInterest.toSeq: _*))
}
