package repro.reference

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Direction.{Diff, Max, Min}

/** Tests of the Listing-4 rewrite generator. */
class ReferenceSkylineSpec extends AnyFunSuite {

  test("complete rewrite has the Listing 4 shape") {
    val sql = ReferenceSkyline.rewrite("hotels", Seq("price", "rating"),
      Seq("price" -> Min, "rating" -> Max), nullAware = false)
    assert(sql.contains("NOT EXISTS"))
    assert(sql.contains("i.price <= o.price"))
    assert(sql.contains("i.rating >= o.rating"))
    assert(sql.contains("i.price < o.price"))
    assert(sql.contains("i.rating > o.rating"))
  }

  test("DIFF dimensions appear as equalities in the soft part only") {
    val sql = ReferenceSkyline.rewrite("t", Seq("a", "b"),
      Seq("a" -> Diff, "b" -> Min), nullAware = false)
    assert(sql.contains("i.a = o.a"))
    assert(!sql.contains("i.a < o.a") && !sql.contains("i.a > o.a"))
  }

  test("null-aware rewrite guards every comparison") {
    val sql = ReferenceSkyline.rewrite("t", Seq("a"), Seq("a" -> Min),
      nullAware = true)
    assert(sql.contains("i.a IS NULL OR o.a IS NULL OR i.a <= o.a"))
    assert(sql.contains("i.a IS NOT NULL AND o.a IS NOT NULL AND i.a < o.a"))
  }

  test("castTo wraps compared values but not the null guards") {
    val sql = ReferenceSkyline.rewrite("t", Seq("a"), Seq("a" -> Min),
      nullAware = true, castTo = Some("DOUBLE"))
    assert(sql.contains("CAST(i.a AS DOUBLE) <= CAST(o.a AS DOUBLE)"))
    assert(sql.contains("i.a IS NULL"))
  }

  test("output columns are aliased on the outer side") {
    val sql = ReferenceSkyline.rewrite("t", Seq("x", "y"), Seq("x" -> Min),
      nullAware = false)
    assert(sql.contains("o.x AS x, o.y AS y"))
  }

  test("DIFF-only dimension list is rejected") {
    intercept[IllegalArgumentException] {
      ReferenceSkyline.rewrite("t", Seq("a"), Seq("a" -> Diff), nullAware = false)
    }
  }

  test("subquery relation is spliced verbatim") {
    val sql = ReferenceSkyline.rewrite("(SELECT * FROM t WHERE x > 1)",
      Seq("x"), Seq("x" -> Min), nullAware = false)
    assert(sql.contains("FROM (SELECT * FROM t WHERE x > 1) AS o"))
    assert(sql.contains("FROM (SELECT * FROM t WHERE x > 1) AS i"))
  }
}

/** Pure tests of the brute-force oracle itself. */
class BruteForceSpec extends AnyFunSuite {
  import org.apache.spark.sql.Row

  test("dominance basics") {
    val dims = Seq(0 -> Min, 1 -> Max)
    assert(BruteForce.dominates(Row(1, 9), Row(2, 8), dims, incomplete = false))
    assert(!BruteForce.dominates(Row(2, 8), Row(1, 9), dims, incomplete = false))
    assert(!BruteForce.dominates(Row(1, 8), Row(1, 8), dims, incomplete = false))
  }

  test("mixed numeric widths compare correctly") {
    val dims = Seq(0 -> Min)
    assert(BruteForce.dominates(Row(1L), Row(2), dims, incomplete = false))
    assert(BruteForce.dominates(Row(1.5), Row(2), dims, incomplete = false))
  }

  test("incomplete dominance skips nulls") {
    val dims = Seq(0 -> Min, 1 -> Min)
    assert(BruteForce.dominates(Row(1, null), Row(2, 0), dims, incomplete = true))
    assert(!BruteForce.dominates(Row(1, null), Row(1, 0), dims, incomplete = true))
  }

  test("paper cycle gives empty skyline") {
    val rows = Seq(Row(1, null, 10), Row(3, 2, null), Row(null, 5, 3))
    val dims = Seq(0 -> Min, 1 -> Min, 2 -> Min)
    assert(BruteForce.skyline(rows, dims, incomplete = true).isEmpty)
  }

  test("distinct keeps first representative") {
    val rows = Seq(Row("a", 1), Row("b", 1), Row("c", 2))
    val dims = Seq(1 -> Min)
    val out = BruteForce.skyline(rows, dims, incomplete = false, distinct = true)
    assert(out == Seq(Row("a", 1)))
  }

  test("skyline of empty input is empty") {
    assert(BruteForce.skyline(Nil, Seq(0 -> Min), incomplete = false).isEmpty)
  }
}
