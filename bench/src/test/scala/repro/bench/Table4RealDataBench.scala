package repro.bench

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.cleaning.BaranParams
import repro.data.Datasets
import repro.eval.{Runner, Tables}

/** Table 4 — cleaning accuracy (precision/recall/F1 per dependency +
  * Overall) on the three real-data stand-ins, for Sparcle (n=2), the
  * distance-weighting ablation (n=0), HoloClean, and Baran.
  *
  * Paper shape asserted here:
  *  - Sparcle's F1 beats HoloClean's on every dependency and Overall;
  *  - on the no-duplicate Austin data HoloClean's recall is ~0;
  *  - Baran runs only on Austin (memory/time failures elsewhere) and loses
  *    clearly to Sparcle there;
  *  - n=2 never loses clearly to n=0.
  */
class Table4RealDataBench extends SparkSpec {

  private implicit lazy val ss: SparkSession = spark
  private val scale = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble

  private lazy val austin = Runner.runDataset(Datasets.austinCode(scale),
    Tables.RangeD("Austin-Code"), BaranParams())
  private lazy val chicago = Runner.runDataset(Datasets.chicagoBuilding(scale),
    Tables.RangeD("Chicago-Building"), BaranParams())
  private lazy val nyc = Runner.runDataset(Datasets.nycCrash(scale),
    Tables.RangeD("NYC-Crash"), BaranParams())

  test("print Table 4") {
    println("\n== Table 4: Cleaning Accuracy on Real Data (stand-ins) ==")
    println(Tables.renderAccuracy("Austin-Code", austin))
    println(Tables.renderAccuracy("Chicago-Building", chicago))
    println(Tables.renderAccuracy("NYC-Crash", nyc))
  }

  test("Sparcle (n=2) F1 beats HoloClean on every dependency") {
    for (run <- Seq(austin, chicago, nyc); r <- run.attrRuns) {
      assert(r.sparcleN2.scores.f1 > r.holo.scores.f1,
        s"${r.attr}: sparcle ${r.sparcleN2.scores.f1} vs holo ${r.holo.scores.f1}")
    }
  }

  test("Sparcle (n=2) Overall F1 beats HoloClean Overall on all datasets") {
    for ((run, name) <- Seq(austin -> "austin", chicago -> "chicago", nyc -> "nyc")) {
      assert(run.overallN2.f1 > run.overallHolo.f1,
        s"$name: ${run.overallN2.f1} vs ${run.overallHolo.f1}")
    }
  }

  test("Austin (no duplicates): HoloClean recall collapses, Sparcle stays high") {
    for (r <- austin.attrRuns) {
      assert(r.holo.scores.recall < 0.1, s"${r.attr}: holo recall ${r.holo.scores.recall}")
      assert(r.sparcleN2.scores.recall > 0.7, s"${r.attr}: sparcle recall ${r.sparcleN2.scores.recall}")
    }
  }

  test("Baran completes on Austin only; larger datasets fail as in the paper") {
    assert(austin.attrRuns.forall(_.baran.isRight), "Baran should finish Austin")
    assert(chicago.attrRuns.forall(_.baran == Left(Runner.MemMarker)),
      "Chicago should die with the memory marker -*")
    assert(nyc.attrRuns.forall(_.baran == Left(Runner.TimeoutMarker)),
      "NYC should die with the one-day marker -#")
  }

  test("Baran on Austin: city (dominated, 9 values) >> zipcode (50 values)") {
    val byAttr = austin.attrRuns.map(r => r.attr -> r.baran.toOption.get.scores).toMap
    assert(byAttr("city").recall > byAttr("zipcode").recall + 0.2,
      s"city ${byAttr("city")} vs zipcode ${byAttr("zipcode")}")
    assert(byAttr("zipcode").f1 < 0.2, s"zipcode should be near-zero: ${byAttr("zipcode")}")
    assert(austin.attrRuns.forall(r =>
      r.sparcleN2.scores.f1 > r.baran.toOption.get.scores.f1), "Sparcle must beat Baran")
  }

  test("distance weighting: n=2 never loses clearly to n=0") {
    for (run <- Seq(austin, chicago, nyc); r <- run.attrRuns) {
      assert(r.sparcleN2.scores.f1 >= r.sparcleN0.scores.f1 - 0.02,
        s"${r.attr}: n2 ${r.sparcleN2.scores.f1} vs n0 ${r.sparcleN0.scores.f1}")
    }
  }

  test("harder dependencies (more distinct values) score lower for Sparcle") {
    val austinMap = austin.attrRuns.map(r => r.attr -> r.sparcleN2.scores.f1).toMap
    assert(austinMap("city") > austinMap("zipcode"),
      s"9-value city should be easier than 50-value zipcode: $austinMap")
    val nycMap = nyc.attrRuns.map(r => r.attr -> r.sparcleN2.scores.f1).toMap
    assert(nycMap("borough") > nycMap("zipcode"),
      s"5-value borough should be easier than 230-value zipcode: $nycMap")
  }
}
