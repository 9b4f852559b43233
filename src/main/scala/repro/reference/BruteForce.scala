package repro.reference

import org.apache.spark.sql.Row
import repro.core.Direction

/** Definitional in-memory skyline — the second, Spark-free oracle.
  *
  * Computes `SKY(R) = {r | ¬∃s: s < r}` by checking every pair, with the
  * complete or incomplete dominance of Definition 3.1. Deliberately naive so
  * its correctness is obvious; property tests diff the physical operators
  * (and the DuckDB rewrite) against it. Unlike `NOT EXISTS` it can also
  * express DISTINCT.
  */
object BruteForce {

  private def cmp(a: Any, b: Any): Int = (a, b) match {
    // Spark Rows surface numerics in various widths; normalize before
    // comparing so tests can mix Int/Long/Double columns freely.
    case (x: Number, y: Number) =>
      java.lang.Double.compare(x.doubleValue(), y.doubleValue())
    case _ => a.asInstanceOf[Comparable[Any]].compareTo(b)
  }

  /** Does tuple `a` dominate tuple `b` on the given (index, direction)
    * dimensions?
    */
  def dominates(
      a: Row,
      b: Row,
      dims: Seq[(Int, Direction)],
      incomplete: Boolean): Boolean = {
    var strict = false
    dims.foreach { case (i, dir) =>
      val av = a.get(i)
      val bv = b.get(i)
      val bothPresent = av != null && bv != null
      if (!bothPresent) {
        if (!incomplete) {
          // complete-mode fallback on dirty data: nulls sort first (matches
          // DominanceChecker so forced-COMPLETE runs stay comparable)
          val c = if (av == null && bv == null) 0 else if (av == null) -1 else 1
          dir match {
            case Direction.Min  => if (c > 0) return false else if (c < 0) strict = true
            case Direction.Max  => if (c < 0) return false else if (c > 0) strict = true
            case Direction.Diff => if (c != 0) return false
          }
        }
        // incomplete mode: skip this dimension entirely
      } else {
        val c = cmp(av, bv)
        dir match {
          case Direction.Min  => if (c > 0) return false else if (c < 0) strict = true
          case Direction.Max  => if (c < 0) return false else if (c > 0) strict = true
          case Direction.Diff => if (c != 0) return false
        }
      }
    }
    strict
  }

  /** The skyline of `rows`; with `distinct`, one row per distinct
    * combination of dimension values (first occurrence wins).
    */
  def skyline(
      rows: Seq[Row],
      dims: Seq[(Int, Direction)],
      incomplete: Boolean,
      distinct: Boolean = false): Seq[Row] = {
    val undominated =
      rows.filter(r => !rows.exists(s => dominates(s, r, dims, incomplete)))
    if (!distinct) undominated
    else {
      val seen = scala.collection.mutable.HashSet.empty[Seq[Any]]
      undominated.filter(r => seen.add(dims.map { case (i, _) => r.get(i) }))
    }
  }
}
