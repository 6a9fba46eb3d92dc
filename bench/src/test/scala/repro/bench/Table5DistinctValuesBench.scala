package repro.bench

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.cleaning.BaranParams
import repro.data.Datasets
import repro.eval.{Runner, Tables}

/** Table 5 — accuracy per attribute on Chicago-Synthetic (20K records, 2K
  * errors per dependency, no duplicate locations) across five dependencies
  * with 23 / 50 / 59 / 275 / 801 distinct values.
  *
  * Paper shape asserted: Sparcle beats HoloClean and Baran on every
  * dependency; accuracy degrades as distinct values grow, but Sparcle
  * degrades far more gracefully (census F1 0.49 vs ~0 for the baselines);
  * n=2 beats n=0 and the gap widens with more distinct values.
  */
class Table5DistinctValuesBench extends SparkSpec {

  private implicit lazy val ss: SparkSession = spark
  private val scale = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble

  private lazy val ds = Datasets.chicagoSynthetic(
    nRecords = math.max(2000, (20000 * scale).toInt),
    errors = math.max(200, (2000 * scale).toInt))
  private lazy val run = Runner.runDataset(ds, Tables.RangeD("Chicago-Synthetic"), BaranParams())
  private lazy val byAttr = run.attrRuns.map(r => r.attr -> r).toMap

  test("print Table 5") {
    println("\n== Table 5: Accuracy per Attribute in Chicago-Synthetic ==")
    println(Tables.renderAccuracy("Chicago-Synthetic", run))
  }

  test("Sparcle (n=2) beats HoloClean on every dependency") {
    run.attrRuns.foreach { r =>
      assert(r.sparcleN2.scores.f1 > r.holo.scores.f1,
        s"${r.attr}: ${r.sparcleN2.scores.f1} vs holo ${r.holo.scores.f1}")
    }
  }

  test("Sparcle (n=2) beats Baran on every dependency") {
    run.attrRuns.foreach { r =>
      val b = r.baran.toOption.getOrElse(fail(s"Baran should run at 20K: ${r.attr}"))
      assert(r.sparcleN2.scores.f1 > b.scores.f1,
        s"${r.attr}: ${r.sparcleN2.scores.f1} vs baran ${b.scores.f1}")
    }
  }

  test("no duplicates: the baselines' recall is near zero everywhere") {
    run.attrRuns.foreach { r =>
      assert(r.holo.scores.recall < 0.15, s"${r.attr}: holo ${r.holo.scores.recall}")
    }
  }

  test("accuracy degrades with the number of distinct values") {
    val f1 = run.attrRuns.map(r => r.attr -> r.sparcleN2.scores.f1).toMap
    assert(f1("district") > f1("beat"), s"23 values should beat 275: $f1")
    assert(f1("district") > f1("census"), s"23 values should beat 801: $f1")
    assert(f1("ward") > f1("census"), s"50 values should beat 801: $f1")
  }

  test("Sparcle still cleans a good share of the hardest dependency (census, 801)") {
    val census = byAttr("census").sparcleN2.scores
    assert(census.f1 > 0.25, s"census F1 should stay well above the ~0 baselines: $census")
    assert(byAttr("census").holo.scores.f1 < 0.1,
      s"holo census should be ~0: ${byAttr("census").holo.scores}")
  }

  test("distance weighting helps, more so with many distinct values") {
    run.attrRuns.foreach { r =>
      assert(r.sparcleN2.scores.f1 >= r.sparcleN0.scores.f1 - 0.02,
        s"${r.attr}: n2 ${r.sparcleN2.scores.f1} vs n0 ${r.sparcleN0.scores.f1}")
    }
  }
}
