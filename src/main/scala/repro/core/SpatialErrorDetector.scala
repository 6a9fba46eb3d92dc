package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Spatial error detector (§3.3, Algorithm 1).
  *
  * One scan over the DistanceMatrix: every row with v1 ≠ v2 moves *both*
  * cells to the erroneous set (at least one of the two conflicting records
  * must be wrong, and we cannot yet tell which). Additionally — as in every
  * host system the paper plugs into — missing (null) cells are erroneous by
  * definition.
  */
object SpatialErrorDetector {

  /** Cells (record ids, since each pipeline run cleans one attribute) deemed
    * erroneous: participants of a value conflict in `dm`, plus null cells.
    * Result: single-column frame `id`.
    */
  def erroneousCells(points: DataFrame, dm: DataFrame): DataFrame = {
    // Null-valued rows never assert a conflict (a missing value contradicts
    // nothing); they are flagged by the null rule below instead.
    val conflicts = dm.where(col("v1").isNotNull && col("v2").isNotNull && col("v1") =!= col("v2"))
    val fromConflicts = conflicts.select(col("r1").as("id"))
      .unionByName(conflicts.select(col("r2").as("id")))
    val fromNulls = points.where(col("value").isNull).select("id")
    fromConflicts.unionByName(fromNulls).distinct()
  }

  /** Complement of [[erroneousCells]] over the input: cells currently deemed
    * clean. Result: single-column frame `id`.
    */
  def cleanCells(points: DataFrame, erroneous: DataFrame): DataFrame =
    points.select("id").join(erroneous, Seq("id"), "left_anti")
}
