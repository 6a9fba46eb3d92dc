package repro.bench

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.data.Datasets
import repro.eval.{Runner, Tables}

/** Table 6 — end-to-end running time per system on the three real-data
  * stand-ins.
  *
  * Paper shape asserted: Sparcle pays a moderate spatial-join overhead over
  * HoloClean (17–29% in the paper; we allow a wider band since our corrector
  * does no network training, which was the paper's dominant shared cost);
  * Baran is the slowest where it finishes (Austin) and fails on
  * Chicago (memory, `-*`) and NYC (one-day cutoff, `-#`).
  */
class Table6RuntimeBench extends SparkSpec {

  private implicit lazy val ss: SparkSession = spark
  private val scale = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble

  private lazy val rows = Seq(
    Datasets.austinCode(scale), Datasets.chicagoBuilding(scale), Datasets.nycCrash(scale),
  ).map(ds => Tables.timeSystems(ds, Tables.RangeD(ds.name)))

  private def row(name: String) = rows.find(_.dataset == name).get

  test("print Table 6") {
    println("\n== Table 6: Running Time on Real Data (stand-ins) ==")
    println(Tables.renderTable6(rows))
  }

  test("all three datasets are timed") {
    assert(rows.map(_.dataset) ==
      Seq("Austin-Code", "Chicago-Building", "NYC-Crash"))
    rows.foreach { r =>
      assert(r.sparcleSec > 0 && r.holoSec > 0)
    }
  }

  test("Baran finishes only on Austin, with the paper's failure markers elsewhere") {
    assert(row("Austin-Code").baran.isRight)
    assert(row("Chicago-Building").baran == Left(Runner.MemMarker))
    assert(row("NYC-Crash").baran == Left(Runner.TimeoutMarker))
  }

  test("Sparcle's spatial overhead over HoloClean stays moderate") {
    // Seconds-scale workloads put JVM/JIT warm-up on whichever system runs
    // first (Sparcle on Austin), so the small-dataset ratio is noisy; the
    // bound guards against pathological blow-ups, not the paper's 1.2–1.3×.
    rows.foreach { r =>
      assert(r.sparcleSec < r.holoSec * 8.0,
        s"${r.dataset}: sparcle ${r.sparcleSec}s vs holo ${r.holoSec}s")
    }
  }

  test("runtime grows with dataset size for Sparcle") {
    assert(row("NYC-Crash").sparcleSec > row("Austin-Code").sparcleSec * 0.8,
      s"NYC (40K) should not be clearly faster than Austin (8K)")
  }
}
