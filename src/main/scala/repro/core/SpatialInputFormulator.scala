package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Spatial input formulators (§5): translate Sparcle's candidate evidence
  * into the input format of the host system's error-correction module.
  *
  * All three formats derive from two aggregates over the DistanceMatrix:
  * `nearW(id, v)` — the summed weight of rows where the cell's neighbors
  * carry value v (carried on the candidates frame) — and `totalW(id)` — the
  * cell's total neighbor weight. For a candidate v of cell id:
  *
  *  - AimNet violation score (§5.1):      viol = totalW − nearW(v)   (lower is better)
  *  - Baran probability vector (§5.2):    p    = nearW(v) / totalW   (higher is better)
  *  - HoloClean/MLNClean factor sum (§5.3): fg  = nearW(v) − (totalW − nearW(v))
  *                                              = 2·nearW(v) − totalW (higher is better)
  *
  * With W ≡ 1 these degrade to the hosts' original violation counts /
  * co-occurrence probabilities / ±1 factor sums, which is exactly how the
  * paper presents the injection (Fig. 4).
  */
object SpatialInputFormulator {

  /** Total neighbor weight per cell: Σ w over DistanceMatrix rows of r1 with
    * a non-null neighbor value. Columns: `id`, `totalW`.
    */
  def totalWeights(dm: DataFrame): DataFrame =
    dm.where(col("v2").isNotNull)
      .groupBy(col("r1").as("id"))
      .agg(sum("w").as("totalW"))

  private def withTotal(candidates: DataFrame, dm: DataFrame): DataFrame =
    candidates.join(totalWeights(dm), Seq("id"), "left")
      .withColumn("totalW", coalesce(col("totalW"), lit(0.0)))

  /** Violation-based feature vectors for AimNet (§5.1, Fig. 4a).
    * Columns: candidates ++ (`totalW`, `viol`).
    */
  def violationVectors(candidates: DataFrame, dm: DataFrame): DataFrame =
    withTotal(candidates, dm).withColumn("viol", col("totalW") - col("nearW"))

  /** Probability-based feature vectors for Baran (§5.2, Fig. 4b).
    * Candidates with no proximity co-occurrence get probability 0.
    * Columns: candidates ++ (`totalW`, `p`).
    */
  def probabilityVectors(candidates: DataFrame, dm: DataFrame): DataFrame =
    withTotal(candidates, dm).withColumn("p",
      when(col("totalW") > 0, col("nearW") / col("totalW")).otherwise(lit(0.0)))

  /** Weighted factor-graph sums for HoloClean/MLNClean (§5.3, Fig. 4c).
    * Columns: candidates ++ (`totalW`, `fg`).
    */
  def factorGraph(candidates: DataFrame, dm: DataFrame): DataFrame =
    withTotal(candidates, dm).withColumn("fg", lit(2.0) * col("nearW") - col("totalW"))

  /** All three host formats in one pass (shares the totalW join).
    * Columns: candidates ++ (`totalW`, `viol`, `p`, `fg`).
    */
  def allFormats(candidates: DataFrame, dm: DataFrame): DataFrame =
    withTotal(candidates, dm)
      .withColumn("viol", col("totalW") - col("nearW"))
      .withColumn("p",
        when(col("totalW") > 0, col("nearW") / col("totalW")).otherwise(lit(0.0)))
      .withColumn("fg", lit(2.0) * col("nearW") - col("totalW"))
}
