package repro.bench

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.eval.Tables

/** Table 3 — properties of the four experiment datasets (scaled stand-ins):
  * records, errors, error-duplication ratio, and distinct values per
  * dependency. Asserts the generated data matches the configured properties,
  * which are the paper's rates and ratios at 1/~12 to 1/~44 scale
  * (DESIGN.md §5).
  */
class Table3DatasetsBench extends SparkSpec {

  private implicit lazy val ss: SparkSession = spark
  private val scale = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble

  private lazy val rows = Tables.table3(scale)
  private def row(ds: String, attr: String) =
    rows.find(r => r.dataset == ds && r.attr == attr).get

  test("print Table 3") {
    println("\n== Table 3: Experiment Datasets (scaled stand-ins) ==")
    println(Tables.renderTable3(rows))
  }

  test("all four datasets and nine real-data dependencies are present") {
    assert(rows.map(_.dataset).distinct.size == 4)
    assert(rows.size == 2 + 3 + 2 + 5)
  }

  test("error rates match the paper's (errors/records per dependency)") {
    // Paper rates: Austin zipcode 15.0%, city 13.1%; Chicago community
    // 14.4%, census 19.0%, ward 24.8%; NYC borough 24.0%, zipcode 30.2%.
    def rate(ds: String, attr: String): Double = {
      val r = row(ds, attr); r.errors.toDouble / r.records
    }
    assert(math.abs(rate("Austin-Code", "zipcode") - 0.150) < 0.01)
    assert(math.abs(rate("Austin-Code", "city") - 0.131) < 0.01)
    assert(math.abs(rate("Chicago-Building", "community") - 0.144) < 0.01)
    assert(math.abs(rate("Chicago-Building", "census") - 0.190) < 0.01)
    assert(math.abs(rate("Chicago-Building", "ward") - 0.248) < 0.01)
    assert(math.abs(rate("NYC-Crash", "borough") - 0.240) < 0.01)
    assert(math.abs(rate("NYC-Crash", "zipcode") - 0.302) < 0.01)
  }

  test("duplication ratios match the paper's Dup. column") {
    assert(row("Austin-Code", "zipcode").dupRatio == 0.0)
    assert(row("Austin-Code", "city").dupRatio == 0.0)
    assert(math.abs(row("Chicago-Building", "community").dupRatio - 0.64) < 0.02)
    assert(math.abs(row("Chicago-Building", "census").dupRatio - 0.64) < 0.02)
    assert(math.abs(row("Chicago-Building", "ward").dupRatio - 0.58) < 0.02)
    assert(math.abs(row("NYC-Crash", "borough").dupRatio - 0.44) < 0.02)
    assert(math.abs(row("NYC-Crash", "zipcode").dupRatio - 0.30) < 0.02)
  }

  test("distinct values match the paper's Dis. column (within sampling slack)") {
    assert(row("Austin-Code", "zipcode").distinct <= 50)
    assert(row("Austin-Code", "zipcode").distinct >= 45)
    assert(row("Austin-Code", "city").distinct <= 9)
    assert(row("Chicago-Building", "community").distinct <= 77)
    assert(row("Chicago-Building", "ward").distinct <= 50)
    assert(row("NYC-Crash", "borough").distinct == 5)
    assert(row("NYC-Crash", "zipcode").distinct <= 230)
    assert(row("Chicago-Synthetic", "district").distinct == 23)
    assert(row("Chicago-Synthetic", "ward").distinct == 50)
    assert(row("Chicago-Synthetic", "zipcode").distinct == 59)
    assert(row("Chicago-Synthetic", "beat").distinct <= 275)
    assert(row("Chicago-Synthetic", "census").distinct <= 801)
  }

  test("Chicago-Synthetic keeps the paper's exact scale at BENCH_SCALE=1") {
    if (scale == 1.0) {
      val r = row("Chicago-Synthetic", "district")
      assert(r.records == 20000)
      assert(r.errors == 2000)
      assert(r.dupRatio == 0.0)
    }
  }
}
