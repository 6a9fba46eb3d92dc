package repro.bench

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.eval.Tables

/** Table 1 — NYC Motor Vehicle Collision borough repair: recall overall and
  * split into errors at duplicated vs new locations, HoloClean vs Sparcle.
  *
  * Paper: HoloClean 58.7% / 99.6% / 30.3%; Sparcle 99.4% / 99.7% / 99.1%.
  * Shape asserted: Sparcle repairs nearly everything in both regimes;
  * HoloClean is near-perfect on duplicated locations but collapses to
  * modal-guess accuracy on new locations, dragging its total far below
  * Sparcle's.
  */
class Table1NycRepairBench extends SparkSpec {

  private implicit lazy val ss: SparkSession = spark
  private val scale = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble

  private lazy val t = Tables.table1(scale)

  test("print Table 1") {
    info("\n" + Tables.renderTable1(t) + "\n")
    println("\n== Table 1: NYC-Crash borough repair recall ==")
    println(Tables.renderTable1(t))
  }

  test("Sparcle repairs nearly all errors overall") {
    assert(t.sparcle.total.recall > 0.9, s"got ${t.sparcle.total.recall}")
  }

  test("Sparcle repairs nearly all errors at new locations") {
    assert(t.sparcle.newLocation.recall > 0.9, s"got ${t.sparcle.newLocation.recall}")
  }

  test("both systems are near-perfect on duplicated locations") {
    assert(t.holo.duplicated.recall > 0.9, s"holo ${t.holo.duplicated.recall}")
    assert(t.sparcle.duplicated.recall > 0.9, s"sparcle ${t.sparcle.duplicated.recall}")
  }

  test("HoloClean collapses on new locations (modal-guess regime)") {
    assert(t.holo.newLocation.recall < 0.6, s"got ${t.holo.newLocation.recall}")
    assert(t.holo.newLocation.recall < t.sparcle.newLocation.recall - 0.3)
  }

  test("the overall gap matches the paper's shape (Sparcle >> HoloClean)") {
    assert(t.sparcle.total.recall - t.holo.total.recall > 0.2,
      s"sparcle ${t.sparcle.total.recall} vs holo ${t.holo.total.recall}")
  }
}
