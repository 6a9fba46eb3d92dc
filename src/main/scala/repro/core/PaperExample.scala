package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

/** The paper's running example (Fig. 3, Table 2, Fig. 4): seven records from
  * a 1,000-record NYC dataset, a SpatialRange constraint with d = 1 km and
  * W = (1 − F/d)², the DistanceMatrix of Fig. 3c and the value-frequency
  * table of Fig. 3b. Golden tests and the Table-2 bench replay Sparcle's
  * modules over this fixture and compare against the paper's printed values.
  */
object PaperExample {

  val D: Double = 1000.0
  val Weight: PowerWeight = PowerWeight(2)
  val Total: Long = 1000L

  val Man = "Manhattan"
  val Queens = "Queens"
  val SI = "S. Island"
  val Bronx = "Bronx"
  val Brooklyn = "Brooklyn"

  /** Original (raw) borough value of each record r1..r7, per Fig. 3a. */
  val OrigValues: Map[Long, String] = Map(
    1L -> SI, 2L -> Man, 3L -> Man, 4L -> Queens, 5L -> Queens, 6L -> Queens, 7L -> Queens,
  )

  /** Fig. 3c: (r1, r2, v1, v2, D). Weights are recomputed from D — the test
    * checks they match the paper's printed W column.
    */
  val MatrixRows: Seq[(Long, Long, String, String, Double)] = Seq(
    (1L, 2L, SI, Man, 200.0), (1L, 3L, SI, Man, 500.0),
    (1L, 4L, SI, Queens, 800.0), (1L, 5L, SI, Queens, 800.0), (1L, 6L, SI, Queens, 800.0),
    (2L, 1L, Man, SI, 200.0), (2L, 3L, Man, Man, 600.0), (2L, 4L, Man, Queens, 900.0),
    (3L, 1L, Man, SI, 500.0), (3L, 2L, Man, Man, 600.0),
    (4L, 1L, Queens, SI, 800.0), (4L, 2L, Queens, Man, 900.0), (4L, 5L, Queens, Queens, 600.0),
    (5L, 1L, Queens, SI, 800.0), (5L, 4L, Queens, Queens, 600.0),
    (5L, 6L, Queens, Queens, 600.0), (5L, 7L, Queens, Queens, 900.0),
    (6L, 1L, Queens, SI, 800.0), (6L, 5L, Queens, Queens, 600.0),
    (7L, 5L, Queens, Queens, 900.0),
  )

  /** Fig. 3b value-frequency table for the full 1,000-record dataset. */
  val ValueFreq: Seq[(String, Long)] = Seq(
    Bronx -> 100L, Brooklyn -> 200L, Man -> 300L, Queens -> 300L, SI -> 100L,
  )

  /** DistanceMatrix frame with weights computed by the constraint's W. */
  def distanceMatrix(spark: SparkSession): DataFrame = {
    import spark.implicits._
    MatrixRows
      .map { case (r1, r2, v1, v2, dist) => (r1, r2, v1, v2, dist, Weight.weight(dist, D)) }
      .toDF("r1", "r2", "v1", "v2", "dist", "w")
  }

  /** The seven records as a points frame. Coordinates are placeholders (the
    * fixture bypasses the spatial join and supplies the matrix directly).
    */
  def points(spark: SparkSession): DataFrame = {
    import spark.implicits._
    OrigValues.toSeq.sortBy(_._1)
      .map { case (id, v) => (id, 0.0, 0.0, v) }
      .toDF("id", "x", "y", "value")
  }

  /** Fig. 3b as a [[ValueStats]] for Phase 2. */
  def stats(spark: SparkSession): ValueStats = {
    import spark.implicits._
    ValueStats(ValueFreq.toDF("value", "cntV"), Total)
  }

  /** Run detector + candidate generator + formulators over the fixture. */
  def run(spark: SparkSession,
          params: CandGenParams = CandGenParams()): (DataFrame, CandidateResult, DataFrame) = {
    val pts = points(spark)
    val dm = distanceMatrix(spark)
    val err = SpatialErrorDetector.erroneousCells(pts, dm)
    val cand = SpatialCandidateGenerator.generate(pts, dm, err, params, stats = Some(stats(spark)))
    val scored = SpatialInputFormulator.allFormats(cand.candidates, dm)
    (err, cand, scored)
  }
}
