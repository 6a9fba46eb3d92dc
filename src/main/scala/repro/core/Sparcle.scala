package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** End-to-end Sparcle configuration for one spatial functional dependency
  * (Lat, Lon) → A.
  */
final case class SparcleParams(
    constraint: SpatialConstraint,
    candGen: CandGenParams = CandGenParams(),
    /** Corrector's initial-value bias: keep the cell's original value unless
      * the best candidate's weighted-violation advantage exceeds this share
      * of the cell's total neighbor weight. Emulates the initial-value
      * feature AimNet learns to weigh against constraint violations.
      */
    keepOriginalMargin: Double = 0.25,
)

/** Everything a run produces, for inspection by tests and benches.
  *
  * @param dm         the DistanceMatrix
  * @param erroneous  cell ids flagged by the spatial error detector
  * @param candidates post-cutoff candidate lists with all formulator scores
  * @param labels     Phase-3 auto-labels
  * @param repairs    cells whose final value differs from the input:
  *                   `id, oldValue (nullable), newValue`
  */
final case class SparcleResult(
    dm: DataFrame,
    erroneous: DataFrame,
    candidates: DataFrame,
    labels: DataFrame,
    repairs: DataFrame,
)

/** The Sparcle pipeline (§2): spatial error detector → spatial candidate
  * generator → spatial input formulator → error corrector.
  *
  * The corrector substitutes the host's statistical repair module (AimNet in
  * the paper's deployment): with all non-spatial signals muted — as in the
  * paper's experiments — the repair minimizes the weighted violation score
  * (the AimNet feature vector of §5.1), with an initial-value bias: the
  * original value is kept unless the best candidate's violation advantage
  * exceeds `keepOriginalMargin` of the cell's total neighbor weight. This is
  * the deterministic analogue of the two features AimNet learns from —
  * constraint violations and the initial value. On the paper's worked
  * example it reproduces Table 2's favored values (r1 → Manhattan,
  * r2 → S. Island, all others keep their original value). Phase-3 labels
  * take precedence, matching the paper's "safely moved to the clean list"
  * semantics.
  */
object Sparcle {

  def clean(points: DataFrame, params: SparcleParams): SparcleResult = {
    val dm = DistanceMatrix.build(points, params.constraint).persist()
    dm.count()

    val erroneous = SpatialErrorDetector.erroneousCells(points, dm).persist()
    erroneous.count()

    val cand = SpatialCandidateGenerator.generate(points, dm, erroneous, params.candGen)
    val scored = SpatialInputFormulator.allFormats(cand.candidates, dm)

    val repairs = repairsFrom(points, erroneous, scored, cand.labels, params.keepOriginalMargin)
    SparcleResult(dm, erroneous, scored, cand.labels, repairs)
  }

  /** Pick the final value per erroneous cell and keep only actual changes.
    *
    * Selection: Phase-3 label if present. Otherwise the candidate minimizing
    * the weighted violation score (ties: normProb desc, value asc), except
    * that the cell's original value — when it survived as a candidate — is
    * kept unless the winner's violation advantage exceeds
    * `margin × totalW` (the initial-value bias).
    */
  def repairsFrom(points: DataFrame, erroneous: DataFrame,
                  scoredCandidates: DataFrame, labels: DataFrame,
                  margin: Double = 0.25): DataFrame = {
    val byCell = Window.partitionBy("id")
      .orderBy(col("viol").asc, col("normProb").desc, col("value").asc)
    val best = scoredCandidates
      .withColumn("pick", row_number().over(byCell))
      .where(col("pick") === 1)
      .select(col("id"), col("value").as("bestValue"), col("viol").as("bestViol"),
              col("totalW"))
    val origRow = scoredCandidates.where(col("isOrig"))
      .select(col("id"), col("value").as("origCand"), col("viol").as("origViol"))
    val picked = best.join(origRow, Seq("id"), "left")
      .select(col("id"),
        when(col("origCand").isNotNull &&
             col("origViol") - col("bestViol") <= lit(margin) * col("totalW"),
             col("origCand"))
          .otherwise(col("bestValue")).as("chosen"))
    val chosen = picked
      .join(labels.withColumnRenamed("label", "labelValue"), Seq("id"), "full_outer")
      .select(col("id"), coalesce(col("labelValue"), col("chosen")).as("newValue"))

    points.select(col("id"), col("value").as("oldValue"))
      .join(erroneous, Seq("id"))
      .join(chosen, Seq("id"))
      .where(col("oldValue").isNull || col("oldValue") =!= col("newValue"))
      .select("id", "oldValue", "newValue")
  }

  /** Apply repairs to the input: returns `id, x, y, value` with repaired
    * values substituted.
    */
  def applyRepairs(points: DataFrame, repairs: DataFrame): DataFrame =
    points.join(repairs.select(col("id"), col("newValue")), Seq("id"), "left")
      .select(col("id"), col("x"), col("y"),
              coalesce(col("newValue"), col("value")).as("value"))
}
