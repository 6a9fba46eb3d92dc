package repro.data

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.geo.{Extent, RegionMap}

class SpatialSynthSpec extends SparkSpec {

  import spark.implicits._
  private implicit lazy val ss: org.apache.spark.sql.SparkSession = spark

  private val extent = Extent(0, 0, 5000, 5000)

  private def spec(n: Int = 1000, dupShare: Double = 0.2, errors: Int = 100,
                   dupRatio: Double = 0.5, missing: Double = 0.4, seed: Long = 91) =
    DatasetSpec("t", extent, n, dupShare,
      Seq(AttrSpec("region", RegionMap.voronoi(extent, 6, "r", 92), errors, dupRatio, missing)),
      seed)

  private lazy val ds = SpatialSynth.generate(spec())
  private lazy val stats = DatasetStats.forAttr(ds, "region")

  test("record count matches the spec") {
    assert(ds.records.count() == 1000)
    assert(ds.truth.count() == 1000)
    assert(stats.records == 1000)
  }

  test("ids are unique and align between records and truth") {
    assert(ds.records.select("id").distinct().count() == 1000)
    assert(ds.records.join(ds.truth, Seq("id")).count() == 1000)
  }

  test("error count matches the spec exactly") {
    assert(stats.errors == 100)
  }

  test("error duplication ratio matches the spec") {
    assert(math.abs(stats.dupRatio - 0.5) < 0.02, s"got ${stats.dupRatio}")
  }

  test("missing/wrong mix roughly follows missingShare") {
    val t = ds.truthFor("region").withColumnRenamed("value", "tv")
    val errs = ds.points("region").join(t, Seq("id"))
      .where($"value".isNull || $"value" =!= $"tv")
    val missing = errs.where($"value".isNull).count()
    assert(missing > 20 && missing < 60, s"missing=$missing of 100 (share 0.4)")
  }

  test("wrong values are always valid labels different from the truth") {
    val labels = RegionMap.voronoi(extent, 6, "r", 92).labels.toSet
    val t = ds.truthFor("region").withColumnRenamed("value", "tv")
    val wrong = ds.points("region").join(t, Seq("id"))
      .where($"value".isNotNull && $"value" =!= $"tv")
    assert(wrong.count() > 0)
    wrong.collect().foreach { r =>
      assert(labels.contains(r.getAs[String]("value")))
      assert(r.getAs[String]("value") != r.getAs[String]("tv"))
    }
  }

  test("truth values equal the region map at each location") {
    val map = RegionMap.voronoi(extent, 6, "r", 92)
    ds.records.join(ds.truthFor("region").withColumnRenamed("value", "tv"), Seq("id"))
      .select("x", "y", "tv").collect().foreach { r =>
        assert(map.regionOf(r.getDouble(0), r.getDouble(1)) == r.getString(2))
      }
  }

  test("duplicated locations host multiple records (hotspot fanout)") {
    val groups = ds.records.groupBy("x", "y").count().where($"count" >= 2)
    val maxGroup = groups.agg(max("count")).as[Long].head()
    assert(maxGroup >= 3, s"hotspots should stack up, max group=$maxGroup")
  }

  test("generation is deterministic in the seed") {
    val a = SpatialSynth.generate(spec()).records.orderBy("id").collect().map(_.toSeq).toSeq
    val b = SpatialSynth.generate(spec()).records.orderBy("id").collect().map(_.toSeq).toSeq
    assert(a == b)
    val c = SpatialSynth.generate(spec(seed = 93)).records.orderBy("id").collect().map(_.toSeq).toSeq
    assert(a != c)
  }

  test("zero dupShare yields all-unique locations") {
    val d0 = SpatialSynth.generate(spec(dupShare = 0.0, dupRatio = 0.0))
    assert(d0.records.groupBy("x", "y").count().where($"count" >= 2).count() == 0)
    assert(DatasetStats.forAttr(d0, "region").dupRatio == 0.0)
  }

  test("dupRatio 1.0 puts every error on a duplicated location") {
    val d1 = SpatialSynth.generate(spec(dupShare = 0.3, dupRatio = 1.0))
    assert(math.abs(DatasetStats.forAttr(d1, "region").dupRatio - 1.0) < 1e-9)
  }

  test("spec validation rejects impossible dup demands") {
    intercept[IllegalArgumentException] {
      DatasetSpec("bad", extent, 100, 0.0,
        Seq(AttrSpec("a", RegionMap.voronoi(extent, 3, "r", 1), 10, 0.5, 0.0)), 1)
    }
  }

  test("multi-attribute datasets corrupt attributes independently") {
    val m = RegionMap.voronoi(extent, 5, "m", 94)
    val d = SpatialSynth.generate(DatasetSpec("multi", extent, 500, 0.0,
      Seq(AttrSpec("a1", m, 50, 0.0, 0.0), AttrSpec("a2", m, 80, 0.0, 0.0)), 95))
    assert(DatasetStats.forAttr(d, "a1").errors == 50)
    assert(DatasetStats.forAttr(d, "a2").errors == 80)
  }

  test("Table 3 stand-ins: Austin-Code properties") {
    val a = Datasets.austinCode(scale = 0.25)
    val st = DatasetStats.forDataset(a)
    assert(a.attrs == Seq("zipcode", "city"))
    val zip = st.find(_.attr == "zipcode").get
    val city = st.find(_.attr == "city").get
    assert(zip.records == 2000)
    assert(zip.errors == 299 && city.errors == 262) // paper rates ~15.0% / ~13.1%
    assert(zip.dupRatio == 0.0 && city.dupRatio == 0.0)
    assert(zip.distinctValues <= 50 && zip.distinctValues > 40)
    assert(city.distinctValues <= 9)
  }

  test("Table 3 stand-ins: city attribute is dominated by Austin") {
    val a = Datasets.austinCode(scale = 0.25)
    val share = a.truth.where($"city" === "Austin").count().toDouble / a.truth.count()
    assert(share > 0.6 && share < 0.9, s"Austin share=$share")
  }

  test("Table 3 stand-ins: NYC-Crash borough errors are almost all missing") {
    val nyc = Datasets.nycCrash(scale = 0.1)
    val t = nyc.truthFor("borough").withColumnRenamed("value", "tv")
    val errs = nyc.points("borough").join(t, Seq("id"))
      .where($"value".isNull || $"value" =!= $"tv")
    val missingShare = errs.where($"value".isNull).count().toDouble / errs.count()
    assert(missingShare > 0.95, s"missing share=$missingShare")
  }

  test("Table 3 stand-ins: Chicago-Building dup ratios near the paper's") {
    val chi = Datasets.chicagoBuilding(scale = 0.2)
    val st = DatasetStats.forDataset(chi).map(s => s.attr -> s).toMap
    assert(math.abs(st("community").dupRatio - 0.64) < 0.05)
    assert(math.abs(st("ward").dupRatio - 0.58) < 0.05)
  }

  test("Chicago-Synthetic: distinct values match Table 3's five dependencies") {
    val syn = Datasets.chicagoSynthetic(nRecords = 4000, errors = 200)
    val st = DatasetStats.forDataset(syn).map(s => s.attr -> s.distinctValues).toMap
    // Small samples may not touch every tiny census tract; allow slack there.
    assert(st("district") == 23)
    assert(st("ward") == 50)
    assert(st("zipcode") == 59)
    assert(st("beat") > 240 && st("beat") <= 275)
    assert(st("census") > 650 && st("census") <= 801)
  }
}
