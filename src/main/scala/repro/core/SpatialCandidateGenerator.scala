package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Parameters of the candidate generation process (§4).
  *
  * @param minProb        Phase-3 cutoff: candidates with normalized
  *                       probability below this are marginal and dropped
  * @param maxProb        Phase-3 labeling threshold: a cell whose top
  *                       candidate exceeds this is auto-labeled clean
  * @param defaultWeight  Phase-1 weight for the cell's original value when no
  *                       nearby record shares it (paper: 0.01)
  * @param minimalityBias Phase-2 pseudo-count for non-co-occurring value
  *                       pairs — the "principle of minimality" 0.1 that gives
  *                       a 10× bias toward the original record value
  */
final case class CandGenParams(
    minProb: Double = 0.05,
    maxProb: Double = 0.95,
    defaultWeight: Double = 0.01,
    minimalityBias: Double = 0.1,
)

/** Output of the spatial candidate generator.
  *
  * @param candidates Candidate list for every detected erroneous cell, after
  *                   the Phase-3 MinProb cutoff. Columns: `id`, `value`,
  *                   `nearW` (sum of nearby co-occurrence weights, 0.0 when
  *                   none — used by the formulators), `sumW` (Phase-1 weight:
  *                   nearW, or the 0.01 default for an original value that
  *                   never co-occurs nearby), `isOrig`, `prob` (Phase-2
  *                   Naive-Bayes probability), `normProb`.
  * @param labels     Cells auto-labeled clean by Phase 3: `id`, `label`.
  * @param remaining  Cells still erroneous after Phase 3: `id`.
  */
final case class CandidateResult(candidates: DataFrame, labels: DataFrame, remaining: DataFrame)

/** Corpus-level statistics backing Phase 2: the value-frequency table
  * Count(v, D) (columns `value`, `cntV`) and the dataset size |D| (Fig. 3b).
  * By default they are derived from the input points; tests reproducing the
  * paper's worked example inject the paper's figures directly.
  */
final case class ValueStats(freq: DataFrame, total: Long)

/** Spatial candidate generator (§4, Algorithm 2).
  *
  * Phase 1 relaxes exact co-occurrence to nearby co-occurrence over the
  * DistanceMatrix and counts it as a distance-weighted sum. Phase 2 scores
  * each candidate with the spatially-relaxed Naive-Bayes estimate
  * `Prob(C=v) = |Spatial(v,R)|/|D| × Π_{A'} Count((v,R.A'),D)/Count(v,D)`,
  * where the record-identifier attribute contributes 1/Count(v,D) for the
  * cell's original value and minimalityBias/Count(v,D) otherwise. Phase 3
  * normalizes, applies the MinProb cutoff and auto-labels dominant cells.
  */
object SpatialCandidateGenerator {

  /** Generate candidates for the erroneous cells.
    *
    * @param points     input records: `id, x, y, value`
    * @param dm         DistanceMatrix of the governing spatial constraint
    * @param erroneous  cell ids flagged by the spatial error detector
    * @param params     generation parameters
    * @param extraAttrs optional additional non-spatial evidence attributes
    *                   A′ (beyond the implicit record identifier): frames of
    *                   `(id, a)` each contributing a
    *                   Count((v, R.A'), D)/Count(v, D) factor, with the
    *                   minimality pseudo-count for unseen pairs
    */
  def generate(points: DataFrame, dm: DataFrame, erroneous: DataFrame,
               params: CandGenParams = CandGenParams(),
               extraAttrs: Seq[DataFrame] = Nil,
               stats: Option[ValueStats] = None): CandidateResult = {
    val total = stats.map(_.total).getOrElse(points.count())
    require(total > 0, "cannot generate candidates over an empty dataset")
    val err = erroneous.select("id")

    // ---- Phase 1: initial candidates = nearby co-occurrences + original value.
    val nearby = dm
      .join(err.withColumnRenamed("id", "r1"), Seq("r1"))
      .where(col("v2").isNotNull)
      .groupBy(col("r1").as("id"), col("v2").as("value"))
      .agg(sum("w").as("nearW"))
    val orig = points.join(err, Seq("id"))
      .where(col("value").isNotNull)
      .select(col("id"), col("value"), lit(true).as("origRow"))
    val merged = nearby
      .join(orig, Seq("id", "value"), "full_outer")
      .select(
        col("id"), col("value"),
        coalesce(col("nearW"), lit(0.0)).as("nearW"),
        coalesce(col("origRow"), lit(false)).as("isOrig"),
      )
      .withColumn("sumW", when(col("nearW") > 0, col("nearW")).otherwise(lit(params.defaultWeight)))

    // ---- Phase 2: Naive-Bayes probability with the spatial term.
    val freq = stats.map(_.freq).getOrElse(
      points.where(col("value").isNotNull)
        .groupBy(col("value")).agg(count(lit(1)).as("cntV")))
    var scored = merged
      .join(freq, Seq("value"), "left")
      .withColumn("cntV", coalesce(col("cntV"), lit(1L)))
      .withColumn("prob",
        (col("sumW") / lit(total.toDouble)) *
        (when(col("isOrig"), lit(1.0)).otherwise(lit(params.minimalityBias)) / col("cntV")))

    // Generic A' factors: Count((v, R.A'), D)/Count(v, D) with minimality
    // smoothing for unseen pairs. Each frame: (id, a).
    extraAttrs.zipWithIndex.foreach { case (attr, i) =>
      val aCol = attr.columns.filterNot(_ == "id").head
      val withVal = points.select(col("id"), col("value")).join(attr, Seq("id"))
      val cooc = withVal
        .where(col("value").isNotNull && col(aCol).isNotNull)
        .groupBy(col("value"), col(aCol))
        .agg(count(lit(1)).as(s"cooc_$i"))
      scored = scored
        .join(attr.select(col("id"), col(aCol)), Seq("id"), "left")
        .join(cooc, Seq("value", aCol), "left")
        .withColumn("prob",
          col("prob") * (coalesce(col(s"cooc_$i"), lit(params.minimalityBias)) / col("cntV")))
        .drop(aCol, s"cooc_$i")
    }

    // ---- Phase 3: normalize, MinProb cutoff, MaxProb labeling.
    val byCell = Window.partitionBy("id")
    val normed = scored
      .withColumn("normProb", col("prob") / sum(col("prob")).over(byCell))
      .withColumn("rk", row_number().over(
        Window.partitionBy("id").orderBy(col("normProb").desc, col("value"))))
    // Never drop a cell's best candidate, even if all are < MinProb.
    val kept = normed
      .where(col("normProb") >= params.minProb || col("rk") === 1)
      .persist()
    kept.count()

    val cellStats = kept.groupBy("id").agg(
      count(lit(1)).as("nCand"),
      max(col("normProb")).as("topProb"),
    )
    val topValue = kept.where(col("rk") === 1).select(col("id"), col("value").as("label"))
    val labels = cellStats
      .where(col("nCand") === 1 || col("topProb") > params.maxProb)
      .join(topValue, Seq("id"))
      .select("id", "label")
    val remaining = err.join(labels, Seq("id"), "left_anti")

    val candidates = kept.select("id", "value", "nearW", "isOrig", "sumW", "prob", "normProb")
    CandidateResult(candidates, labels, remaining)
  }
}
