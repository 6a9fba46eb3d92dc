package repro.eval

import org.apache.spark.sql.DataFrame

import repro.cleaning.{BaranLike, BaranMemoryError, BaranParams, BaranTimeoutError, HoloCleanLike}
import repro.core._
import repro.data.SpatialDataset

/** Shared harness that runs the four compared systems — Sparcle (n=2),
  * Sparcle (n=0, the distance-weighting ablation), HoloClean-like, and
  * Baran-like — over one dependency of a dataset, exactly as the paper's
  * Tables 4 and 5 do. Baran failures surface as `Left(reason)` mirroring the
  * paper's footnote markers.
  */
object Runner {

  /** Paper-style marker for a Baran abort: `-*` memory, `-#` one-day cutoff. */
  val MemMarker = "-*"
  val TimeoutMarker = "-#"

  final case class SystemRun(repairs: DataFrame, scores: Scores)

  final case class AttrRun(
      attr: String,
      sparcleN2: SystemRun,
      sparcleN0: SystemRun,
      holo: SystemRun,
      baran: Either[String, SystemRun],
  )

  def sparcleRepairs(ds: SpatialDataset, attr: String, d: Double, n: Double,
                     candGen: CandGenParams = CandGenParams()): DataFrame =
    Sparcle.clean(ds.points(attr), SparcleParams(SpatialRange(d, PowerWeight(n)), candGen)).repairs

  def holoRepairs(ds: SpatialDataset, attr: String): DataFrame =
    HoloCleanLike.clean(ds.points(attr)).repairs

  def baranRepairs(ds: SpatialDataset, attr: String,
                   params: BaranParams = BaranParams()): Either[String, DataFrame] =
    try Right(BaranLike.clean(ds.points(attr), ds.truthFor(attr), params))
    catch {
      case _: BaranMemoryError  => Left(MemMarker)
      case _: BaranTimeoutError => Left(TimeoutMarker)
    }

  /** Run all four systems on one dependency and score them. */
  def runAttr(ds: SpatialDataset, attr: String, d: Double,
              baranParams: BaranParams = BaranParams()): AttrRun = {
    val pts = ds.points(attr)
    val truth = ds.truthFor(attr)
    def scored(r: DataFrame) = SystemRun(r, Metrics.score(pts, truth, r))

    AttrRun(
      attr,
      scored(sparcleRepairs(ds, attr, d, n = 2)),
      scored(sparcleRepairs(ds, attr, d, n = 0)),
      scored(holoRepairs(ds, attr)),
      baranRepairs(ds, attr, baranParams).map(scored),
    )
  }

  /** Run every dependency of a dataset, then add the paper's record-level
    * "Overall" row per system. Baran's Overall is `Left` if it failed on any
    * dependency (the paper's whole-dataset run dies once).
    */
  final case class DatasetRun(attrRuns: Seq[AttrRun],
                              overallN2: Scores, overallN0: Scores, overallHolo: Scores,
                              overallBaran: Either[String, Scores])

  def runDataset(ds: SpatialDataset, d: Double,
                 baranParams: BaranParams = BaranParams()): DatasetRun = {
    val runs = ds.attrs.map(a => runAttr(ds, a, d, baranParams))
    def overallOf(pick: AttrRun => DataFrame): Scores =
      Metrics.overall(ds.records, ds.truth,
        runs.map(r => r.attr -> pick(r)).toMap)
    val baranOverall: Either[String, Scores] =
      runs.collectFirst { case AttrRun(_, _, _, _, Left(m)) => m } match {
        case Some(m) => Left(m)
        case None => Right(Metrics.overall(ds.records, ds.truth,
          runs.map(r => r.attr -> r.baran.toOption.get.repairs).toMap))
      }
    DatasetRun(
      runs,
      overallOf(_.sparcleN2.repairs),
      overallOf(_.sparcleN0.repairs),
      overallOf(_.holo.repairs),
      baranOverall,
    )
  }
}

/** Minimal fixed-width table printer for the bench output. */
object TableFmt {
  def render(headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = headers +: rows
    val widths = headers.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (line(headers) +: sep +: rows.map(line)).mkString("\n")
  }

  def f3(d: Double): String = f"$d%.3f"
  def f2(d: Double): String = f"$d%.2f"
}
