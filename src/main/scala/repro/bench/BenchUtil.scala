package repro.bench

import org.apache.spark.sql.SparkSession
import java.util.concurrent.atomic.AtomicReference

/** Timing, timeout and table-rendering utilities for the benchmark harness.
  *
  * Timeouts mirror the paper's 3600 s cutoff (scaled down): the measured
  * action runs in its own thread under a Spark job group; on timeout the job
  * group is cancelled and the cell is reported as "t.o.".
  */
object BenchUtil {

  /** One measurement: wall-clock seconds and the result cardinality (used
    * as a cross-algorithm sanity check); both None on timeout or failure.
    */
  final case class Cell(seconds: Option[Double], rows: Option[Long]) {
    def timedOut: Boolean = seconds.isEmpty
  }

  /** Run `body` (returning a row count) with a timeout; cancel via job group. */
  def timed(spark: SparkSession, timeoutSec: Int)(body: => Long): Cell = {
    val group = s"skyline-bench-${System.nanoTime()}"
    val result = new AtomicReference[Option[Long]](None)
    val error = new AtomicReference[Option[Throwable]](None)
    val t0 = System.nanoTime()
    val worker = new Thread(() => {
      spark.sparkContext.setJobGroup(group, "skyline bench cell", interruptOnCancel = true)
      try result.set(Some(body))
      catch { case t: Throwable => error.set(Some(t)) }
      finally spark.sparkContext.clearJobGroup()
    }, group)
    worker.setDaemon(true)
    worker.start()
    worker.join(timeoutSec * 1000L)
    if (worker.isAlive) {
      spark.sparkContext.cancelJobGroup(group)
      worker.join(30000L)
      Cell(None, None)
    } else {
      error.get().foreach { t =>
        Console.err.println(s"[bench] cell failed: ${t.getMessage}")
      }
      result.get() match {
        case Some(n) => Cell(Some((System.nanoTime() - t0) / 1e9), Some(n))
        case None    => Cell(None, None)
      }
    }
  }

  /** A rendered benchmark table in the paper's Appendix D layout: one block
    * of percentages relative to the reference algorithm, one block of
    * absolute seconds.
    */
  final case class BenchTable(
      title: String,
      colLabels: Seq[String],
      rows: Seq[(String, Seq[Cell])]) {

    private def fmtSec(c: Cell): String =
      c.seconds.map(s => f"$s%.2f").getOrElse("t.o.")

    private def fmtPct(c: Cell, ref: Cell): String =
      (c.seconds, ref.seconds) match {
        case (_, None)            => "n.a."
        case (None, _)            => "t.o."
        case (Some(s), Some(r))   => f"${100.0 * s / r}%.2f%%"
      }

    def render: String = {
      val refRow = rows.find(_._1 == "reference").map(_._2)
      val header = ("algorithm" +: colLabels).mkString("| ", " | ", " |")
      val sep = Seq.fill(colLabels.size + 1)("---").mkString("| ", " | ", " |")
      val pctBlock = refRow.fold("") { ref =>
        rows.map { case (name, cells) =>
          (name +: cells.zip(ref).map { case (c, r) => fmtPct(c, r) })
            .mkString("| ", " | ", " |")
        }.mkString("", "\n", "\n\n")
      }
      val secBlock = rows.map { case (name, cells) =>
        (name +: cells.map(fmtSec)).mkString("| ", " | ", " |")
      }.mkString("\n")
      s"### $title\n\n$header\n$sep\n$pctBlock$header\n$sep\n$secBlock\n"
    }

    /** Emit to stdout and persist under bench/results/ (the bench project's
      * forked JVM already runs with cwd bench/).
      */
    def report(fileName: String): Unit = {
      val text = render
      println()
      println(text)
      val cwd = new java.io.File(".").getCanonicalFile
      val dir =
        if (cwd.getName == "bench") new java.io.File(cwd, "results")
        else new java.io.File(cwd, "bench/results")
      dir.mkdirs()
      val f = new java.io.File(dir, fileName)
      val w = new java.io.PrintWriter(f, "UTF-8")
      try w.println(text) finally w.close()
    }
  }

  /** Environment-overridable integer knob. */
  def envInt(name: String, default: Int): Int =
    sys.env.get(name).map(_.toInt).getOrElse(default)
}
