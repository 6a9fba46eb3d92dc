package repro.spatialjoin

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** k-nearest-neighbor self-join, built on [[RangeJoin]] with an iterative
  * radius-doubling search.
  *
  * Each round performs a grid range join at the current radius for the probes
  * that have not yet found `k` neighbors; probes that have are finalized.
  * The radius doubles until it reaches `maxRadius` (callers pass the extent
  * diagonal), at which point the 3×3 grid neighborhood spans the whole
  * extent, so every remaining probe sees every other point and terminates.
  * Correctness: once a probe has ≥ k candidates within radius r, its true
  * kth-nearest distance is < r, so the candidate set contains the true kNN.
  *
  * Every per-round frame is eagerly local-checkpointed: the loop otherwise
  * accumulates an exponentially deep lineage (left-anti chains + union
  * trees) whose Catalyst planning time dwarfs the actual work.
  *
  * Output columns: `r1, r2, v1, v2, dist, dk` where r2 ranges over the k
  * nearest neighbors of r1 (ties broken by (dist, r2) for determinism) and
  * `dk` is the distance of r1's kth neighbor — the paper uses dk as the "d"
  * of the weight function for kNN constraints. The relation is asymmetric,
  * as in the paper's example (r7 lists one neighbor yet appears in r5's list).
  */
object KnnJoin {

  def pairs(points: DataFrame, k: Int, initRadius: Double, maxRadius: Double): DataFrame = {
    require(k >= 1, s"k must be >= 1, got $k")
    require(initRadius > 0 && maxRadius >= initRadius,
      s"bad radii: init=$initRadius max=$maxRadius")

    val spark = points.sparkSession
    val n = points.count()
    // A point can have at most n-1 neighbors; clamp like real kNN systems do.
    val kEff = math.min(k.toLong, math.max(0L, n - 1)).toInt
    if (kEff == 0) return emptyPairs(spark)

    val all = points.localCheckpoint(true)

    var remaining = all
    var collected: Option[DataFrame] = None
    var r = initRadius
    var exhausted = false

    while (!exhausted && remaining.count() > 0) {
      // At r >= maxRadius the grid query is total: everything finishes.
      val total = r >= maxRadius
      val cand = RangeJoin.pairsAsym(remaining, all, math.max(r, 1e-9)).localCheckpoint(true)
      val counts = cand.groupBy("r1").agg(count(lit(1)).as("nnb"))
      val doneIds =
        if (total) remaining.select(col("id").as("r1"))
        else counts.where(col("nnb") >= kEff).select("r1")
      val donePairs = cand.join(doneIds, Seq("r1"))
      collected = Some(collected.fold(donePairs)(_.unionByName(donePairs)).localCheckpoint(true))
      remaining = remaining
        .join(doneIds.withColumnRenamed("r1", "id"), Seq("id"), "left_anti")
        .localCheckpoint(true)
      exhausted = total
      r = math.min(r * 2, maxRadius)
    }

    val pairsAll = collected.getOrElse(emptyPairs(spark).drop("dk"))
    val byDist = Window.partitionBy("r1").orderBy(col("dist"), col("r2"))
    pairsAll
      .withColumn("rank", row_number().over(byDist))
      .where(col("rank") <= kEff)
      .withColumn("dk", max(col("dist")).over(Window.partitionBy("r1")))
      .select("r1", "r2", "v1", "v2", "dist", "dk")
      .localCheckpoint(true)
  }

  private def emptyPairs(spark: SparkSession): DataFrame = {
    import org.apache.spark.sql.types._
    val schema = StructType(Seq(
      StructField("r1", LongType), StructField("r2", LongType),
      StructField("v1", StringType), StructField("v2", StringType),
      StructField("dist", DoubleType), StructField("dk", DoubleType),
    ))
    spark.createDataFrame(spark.sparkContext.emptyRDD[org.apache.spark.sql.Row], schema)
  }
}
