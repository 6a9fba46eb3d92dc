package repro

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.geo.Geo

/** Shared helpers for spatial-join tests: points-contract frames from
  * literal tuples, plus driver-side brute-force references.
  */
object TestPoints {

  type Pt = (Long, Double, Double, String)

  def df(spark: SparkSession, pts: Seq[Pt]): DataFrame = {
    import spark.implicits._
    pts.toDF("id", "x", "y", "value")
  }

  /** Random point set, deterministic in the seed. `nullEvery` > 0 blanks
    * every nth value.
    */
  def random(n: Int, extent: Double, nValues: Int, seed: Long, nullEvery: Int = 0): Seq[Pt] = {
    val rng = new scala.util.Random(seed)
    (0L until n.toLong).map { i =>
      val v =
        if (nullEvery > 0 && i % nullEvery == nullEvery - 1) null
        else s"v${rng.nextInt(nValues)}"
      (i, rng.nextDouble() * extent, rng.nextDouble() * extent, v)
    }
  }

  /** Brute-force range pairs: all ordered pairs with dist < d. */
  def brutePairs(pts: Seq[Pt], d: Double): Seq[(Long, Long, String, String, Double)] =
    for {
      a <- pts; b <- pts if a._1 != b._1
      dist = Geo.dist(a._2, a._3, b._2, b._3) if dist < d
    } yield (a._1, b._1, a._4, b._4, dist)

  /** Brute-force kNN: for each point, its k nearest neighbors (ties broken
    * by (dist, id)) and the kth distance.
    */
  def bruteKnn(pts: Seq[Pt], k: Int): Seq[(Long, Long, String, String, Double, Double)] =
    pts.flatMap { a =>
      val nbrs = pts.filter(_._1 != a._1)
        .map(b => (b, Geo.dist(a._2, a._3, b._2, b._3)))
        .sortBy { case (b, dist) => (dist, b._1) }
        .take(k)
      if (nbrs.isEmpty) Nil
      else {
        val dk = nbrs.last._2
        nbrs.map { case (b, dist) => (a._1, b._1, a._4, b._4, dist, dk) }
      }
    }
}
