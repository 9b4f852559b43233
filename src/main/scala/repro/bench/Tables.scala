package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core.Direction
import repro.data.SkylineData
import BenchUtil.{envInt, BenchTable}
import Harness.Column

/** One entry point per reproduced evaluation table (paper Tables 3–12,
  * Appendix D) plus the Appendix E complex-query experiment.
  *
  * Scale: the paper ran 0.8M–10M tuples on an 864-core cluster with a
  * 3600 s timeout; these defaults run 15k–100k tuples on one machine with a
  * 90 s timeout (same quadratic reference vs. near-linear specialized
  * trade-off, proportionally smaller crossover points). Override via
  * SKYLINE_BENCH_* environment variables.
  */
object Tables {

  def timeoutSec: Int = envInt("SKYLINE_BENCH_TIMEOUT", 90)

  // dataset sizes (paper: Airbnb 820,698 complete / 1,193,465 incomplete;
  // store_sales 10M complete / 1M–5M incomplete)
  def airbnbComplete: Int = envInt("SKYLINE_BENCH_AIRBNB", 80000)
  def airbnbIncomplete: Int = (airbnbComplete * 1.45).toInt
  def storeSalesT5: Int = envInt("SKYLINE_BENCH_SS", 250000)
  def storeSalesT6: Int = storeSalesT5 / 10 // paper: 10× smaller to avoid t.o.
  def sizeSweep: Seq[Int] = {
    val base = envInt("SKYLINE_BENCH_SS_SWEEP_BASE", 50000)
    Seq(base, 2 * base, 5 * base, 10 * base) // paper: 1M, 2M, 5M, 10M
  }
  def executorSweep: Seq[Int] = Seq(1, 2, 3, 5, 10)

  private val NullFrac = 0.15

  private def dimPrefixes(dims: Seq[(String, Direction)]): Seq[(String, Seq[(String, Direction)])] =
    (1 to dims.size).map(k => k.toString -> dims.take(k))

  /** Table 3: number of dimensions vs execution time, complete Airbnb. */
  def table3(spark: SparkSession): BenchTable = {
    val data = SkylineData.airbnb(spark, airbnbComplete)
    Harness.runGrid(spark,
      s"Table 3 — dims vs time, complete Airbnb (executors: 5, tuples: $airbnbComplete)",
      dimPrefixes(SkylineData.airbnbDims).map { case (l, d) => Column(l, data, d, 5) },
      Harness.CompleteAlgos, nullAware = false, timeoutSec)
  }

  /** Table 4: number of dimensions, incomplete Airbnb. */
  def table4(spark: SparkSession): BenchTable = {
    val data = SkylineData.airbnb(spark, airbnbIncomplete, NullFrac)
    Harness.runGrid(spark,
      s"Table 4 — dims vs time, incomplete Airbnb (executors: 5, tuples: $airbnbIncomplete)",
      dimPrefixes(SkylineData.airbnbDims).map { case (l, d) => Column(l, data, d, 5) },
      Harness.IncompleteAlgos, nullAware = true, timeoutSec)
  }

  /** Table 5: number of dimensions, complete store_sales. */
  def table5(spark: SparkSession): BenchTable = {
    val data = SkylineData.storeSales(spark, storeSalesT5)
    Harness.runGrid(spark,
      s"Table 5 — dims vs time, complete store_sales (executors: 10, tuples: $storeSalesT5)",
      dimPrefixes(SkylineData.storeSalesDims).map { case (l, d) => Column(l, data, d, 10) },
      Harness.CompleteAlgos, nullAware = false, timeoutSec)
  }

  /** Table 6: number of dimensions, incomplete store_sales (10× smaller). */
  def table6(spark: SparkSession): BenchTable = {
    val data = SkylineData.storeSales(spark, storeSalesT6, NullFrac)
    Harness.runGrid(spark,
      s"Table 6 — dims vs time, incomplete store_sales (executors: 10, tuples: $storeSalesT6)",
      dimPrefixes(SkylineData.storeSalesDims).map { case (l, d) => Column(l, data, d, 10) },
      Harness.IncompleteAlgos, nullAware = true, timeoutSec)
  }

  /** Table 7: number of tuples, complete store_sales, 6 dims. */
  def table7(spark: SparkSession): BenchTable =
    Harness.runGrid(spark,
      "Table 7 — tuples vs time, complete store_sales (executors: 3, dims: 6)",
      sizeSweep.map(n =>
        Column(n.toString, SkylineData.storeSales(spark, n), SkylineData.storeSalesDims, 3)),
      Harness.CompleteAlgos, nullAware = false, timeoutSec)

  /** Table 8: number of tuples, incomplete store_sales, 6 dims. */
  def table8(spark: SparkSession): BenchTable =
    Harness.runGrid(spark,
      "Table 8 — tuples vs time, incomplete store_sales (executors: 3, dims: 6)",
      sizeSweep.map(n =>
        Column(n.toString, SkylineData.storeSales(spark, n, NullFrac),
          SkylineData.storeSalesDims, 3)),
      Harness.IncompleteAlgos, nullAware = true, timeoutSec)

  /** Table 9: number of executors, complete Airbnb, 6 dims. */
  def table9(spark: SparkSession): BenchTable = {
    val data = SkylineData.airbnb(spark, airbnbComplete)
    Harness.runGrid(spark,
      s"Table 9 — executors vs time, complete Airbnb (tuples: $airbnbComplete, dims: 6)",
      executorSweep.map(k => Column(k.toString, data, SkylineData.airbnbDims, k)),
      Harness.CompleteAlgos, nullAware = false, timeoutSec)
  }

  /** Table 10: number of executors, incomplete Airbnb, 6 dims. */
  def table10(spark: SparkSession): BenchTable = {
    val data = SkylineData.airbnb(spark, airbnbIncomplete, NullFrac)
    Harness.runGrid(spark,
      s"Table 10 — executors vs time, incomplete Airbnb (tuples: $airbnbIncomplete, dims: 6)",
      executorSweep.map(k => Column(k.toString, data, SkylineData.airbnbDims, k)),
      Harness.IncompleteAlgos, nullAware = true, timeoutSec)
  }

  /** Table 11: number of executors, complete store_sales (largest), 6 dims. */
  def table11(spark: SparkSession): BenchTable = {
    val n = sizeSweep.last
    val data = SkylineData.storeSales(spark, n)
    Harness.runGrid(spark,
      s"Table 11 — executors vs time, complete store_sales (tuples: $n, dims: 6)",
      executorSweep.map(k => Column(k.toString, data, SkylineData.storeSalesDims, k)),
      Harness.CompleteAlgos, nullAware = false, timeoutSec)
  }

  /** Table 12: number of executors, incomplete store_sales (5M analogue), 6 dims. */
  def table12(spark: SparkSession): BenchTable = {
    val n = sizeSweep(2)
    val data = SkylineData.storeSales(spark, n, NullFrac)
    Harness.runGrid(spark,
      s"Table 12 — executors vs time, incomplete store_sales (tuples: $n, dims: 6)",
      executorSweep.map(k => Column(k.toString, data, SkylineData.storeSalesDims, k)),
      Harness.IncompleteAlgos, nullAware = true, timeoutSec)
  }

  /** Appendix E: skyline over a complex query (joins + aggregates) on the
    * MusicBrainz-like dataset; dimension sweep at 3 executors. Shape-check
    * companion to Figures 16–19 (figures themselves are out of scope).
    */
  def musicBrainz(spark: SparkSession, incomplete: Boolean): BenchTable = {
    val n = envInt("SKYLINE_BENCH_MB", 30000)
    val (rec, meta, track) = SkylineData.musicBrainz(spark, n,
      if (incomplete) NullFrac else 0.0)
    rec.createOrReplaceTempView("mb_recording")
    meta.createOrReplaceTempView("mb_meta")
    track.createOrReplaceTempView("mb_track")
    // Listing 11 (complete: nulls coalesced away) vs Listing 12 (incomplete:
    // raw values, left-outer join leaves num_tracks/min_position null)
    val trackAgg =
      """LEFT OUTER JOIN (
        |  SELECT recording AS id, count(1) AS num_tracks,
        |         min(position) AS min_position
        |  FROM mb_track GROUP BY recording
        |) t USING (id)
        |JOIN mb_meta m USING (id)""".stripMargin
    val base =
      if (incomplete) spark.sql(
        s"""SELECT r.id, r.length, r.video, m.rating, m.rating_count,
           |       t.num_tracks, t.min_position
           |FROM mb_recording r
           |$trackAgg""".stripMargin)
      else spark.sql(
        s"""SELECT r.id, ifnull(r.length, 0) AS length, r.video,
           |       ifnull(m.rating, 0) AS rating,
           |       ifnull(m.rating_count, 0) AS rating_count,
           |       ifnull(t.num_tracks, 0) AS num_tracks,
           |       ifnull(t.min_position, 99) AS min_position
           |FROM mb_recording r
           |$trackAgg""".stripMargin)
    val variant = if (incomplete) "incomplete" else "complete"
    Harness.runGrid(spark,
      s"Appendix E — dims vs time, $variant MusicBrainz complex query (executors: 3, recordings: $n)",
      dimPrefixes(SkylineData.musicBrainzDims).map { case (l, d) =>
        Column(l, base, d, 3)
      },
      if (incomplete) Harness.IncompleteAlgos else Harness.CompleteAlgos,
      nullAware = incomplete, timeoutSec)
  }
}
