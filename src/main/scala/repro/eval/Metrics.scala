package repro.eval

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Cleaning accuracy for one dependency, per the paper's §6 metrics:
  * precision = correct repairs / repairs made,
  * recall    = correct repairs / errors in the data,
  * F1        = harmonic mean.
  */
final case class Scores(repairs: Long, correctRepairs: Long, errors: Long) {
  def precision: Double = if (repairs == 0) 0.0 else correctRepairs.toDouble / repairs
  def recall: Double    = if (errors == 0) 0.0 else correctRepairs.toDouble / errors
  def f1: Double = {
    val p = precision; val r = recall
    if (p + r == 0) 0.0 else 2 * p * r / (p + r)
  }
  override def toString: String =
    f"P=$precision%.3f R=$recall%.3f F1=$f1%.3f (repairs=$repairs correct=$correctRepairs errors=$errors)"
}

/** Table-1-style recall split: overall, errors at duplicated locations,
  * errors at new (non-duplicated) locations.
  */
final case class DupSplit(total: Scores, duplicated: Scores, newLocation: Scores)

object Metrics {

  /** Score one dependency's repairs.
    *
    * @param points  dirty input (`id, x, y, value`)
    * @param truth   ground truth (`id, value`)
    * @param repairs repair frame (`id, oldValue, newValue`)
    */
  def score(points: DataFrame, truth: DataFrame, repairs: DataFrame): Scores = {
    val t = truth.withColumnRenamed("value", "truthValue")
    val joined = points.join(t, Seq("id"))
    val errors = joined.where(col("value").isNull || col("value") =!= col("truthValue")).count()
    val rep = repairs.join(t, Seq("id"))
    val nRep = rep.count()
    val correct = rep.where(col("newValue") === col("truthValue")).count()
    Scores(nRep, correct, errors)
  }

  /** Score with the duplicated/new-location split of Table 1. A record is
    * "duplicated" iff at least one other record shares its exact (x, y).
    */
  def dupSplit(points: DataFrame, truth: DataFrame, repairs: DataFrame): DupSplit = {
    val locCounts = points.groupBy("x", "y").agg(count(lit(1)).as("locN"))
    val tagged = points.join(locCounts, Seq("x", "y"))
      .select(col("id"), col("x"), col("y"), col("value"), (col("locN") >= 2).as("isDup"))
      .persist()
    tagged.count()
    def sub(dup: Boolean): Scores = {
      val ids = tagged.where(col("isDup") === dup).select("id")
      score(tagged.join(ids, Seq("id")).select("id", "x", "y", "value"),
            truth.join(ids, Seq("id")),
            repairs.join(ids, Seq("id")))
    }
    val out = DupSplit(score(tagged.select("id", "x", "y", "value"), truth, repairs),
                       sub(dup = true), sub(dup = false))
    tagged.unpersist()
    out
  }

  /** Paper-style "Overall" accuracy over all dependencies of a dataset:
    * computed on records *completely corrected for all their functional
    * dependencies* (Table 4 caption). A record counts as erroneous if any
    * attribute is wrong; as repaired if any repair touched it; as correct if
    * after applying all repairs every attribute matches the truth.
    *
    * @param records dirty records (`id, x, y, attr...`)
    * @param truth   ground truth (`id, attr...`)
    * @param repairsByAttr one repair frame (`id, oldValue, newValue`) per attr
    */
  def overall(records: DataFrame, truth: DataFrame,
              repairsByAttr: Map[String, DataFrame]): Scores = {
    val attrs = repairsByAttr.keys.toSeq.sorted
    var cleaned = records
    attrs.foreach { a =>
      cleaned = cleaned
        .join(repairsByAttr(a).select(col("id"), col("newValue").as(s"rep_$a")), Seq("id"), "left")
        .withColumn(a, coalesce(col(s"rep_$a"), col(a)))
    }
    val t = truth.select(col("id") +: attrs.map(a => col(a).as(s"truth_$a")): _*)
    val j = cleaned.join(t, Seq("id")).persist()
    j.count()

    val origT = records.join(t, Seq("id"))
    val errRecords = origT.where(
      attrs.map(a => col(a).isNull || col(a) =!= col(s"truth_$a")).reduce(_ || _)).select("id")
    val repairedRecords = repairsByAttr.values.map(_.select("id")).reduce(_ unionByName _).distinct()

    val allCorrect = j.where(
      attrs.map(a => col(a).isNotNull && col(a) === col(s"truth_$a")).reduce(_ && _)).select("id")

    val nErr = errRecords.count()
    val nRep = repairedRecords.count()
    val correctRepaired = repairedRecords.join(allCorrect, Seq("id")).count()
    j.unpersist()
    Scores(nRep, correctRepaired, nErr)
  }
}
