package repro.data

import org.apache.spark.sql.functions._

/** Per-dependency dataset properties — the columns of the paper's Table 3:
  * record count, error count, error duplication ratio (share of erroneous
  * records located at the exact position of some other record), and the
  * number of distinct values of the dependent attribute.
  */
final case class AttrStats(attr: String, records: Long, errors: Long,
                           dupRatio: Double, distinctValues: Long)

object DatasetStats {

  /** Recompute Table-3 statistics from the generated data itself (not the
    * spec) so the generator is audited, not trusted.
    */
  def forAttr(ds: SpatialDataset, attr: String): AttrStats = {
    val pts = ds.points(attr)
    val truth = ds.truthFor(attr).withColumnRenamed("value", "truthValue")
    val n = pts.count()

    val joined = pts.join(truth, Seq("id"))
    val errs = joined.where(col("value").isNull || col("value") =!= col("truthValue")).persist()
    val nErr = errs.count()

    // A record sits at a duplicated location iff ≥ 2 records share its (x,y).
    val locCounts = pts.groupBy("x", "y").agg(count(lit(1)).as("locN"))
    val dupErrs = errs.join(locCounts, Seq("x", "y")).where(col("locN") >= 2).count()
    val dupRatio = if (nErr == 0) 0.0 else dupErrs.toDouble / nErr

    val distinct = truth.select("truthValue").distinct().count()
    errs.unpersist()
    AttrStats(attr, n, nErr, dupRatio, distinct)
  }

  def forDataset(ds: SpatialDataset): Seq[AttrStats] = ds.attrs.map(forAttr(ds, _))
}
