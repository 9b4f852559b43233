package repro.core

import org.apache.spark.sql.types._
import org.apache.spark.unsafe.types.UTF8String
import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Unit tests for the typed dominance utility (§5.5, Definition 3.1). */
class DominanceCheckerSpec extends AnyFunSuite {

  private def checker(dirs: Seq[Direction], incomplete: Boolean = false,
                      types: Seq[DataType] = null): DominanceChecker = {
    val t = Option(types).getOrElse(dirs.map(_ => IntegerType: DataType))
    new DominanceChecker(t.toArray, dirs.toArray, incomplete)
  }

  private def t(vs: Any*): Array[Any] = vs.toArray

  import Direction._

  // ---- complete semantics ----------------------------------------------

  test("MIN: smaller value dominates") {
    val c = checker(Seq(Min))
    assert(c.dominates(t(1), t(2)))
    assert(!c.dominates(t(2), t(1)))
  }

  test("MAX: larger value dominates") {
    val c = checker(Seq(Max))
    assert(c.dominates(t(5), t(3)))
    assert(!c.dominates(t(3), t(5)))
  }

  test("equal tuples never dominate each other (strictness)") {
    val c = checker(Seq(Min, Max))
    assert(!c.dominates(t(1, 2), t(1, 2)))
  }

  test("dominance needs at-least-as-good in every dimension") {
    val c = checker(Seq(Min, Min))
    assert(!c.dominates(t(1, 5), t(2, 3))) // better in d1, worse in d2
    assert(!c.dominates(t(2, 3), t(1, 5)))
  }

  test("dominance with equality in some dimensions") {
    val c = checker(Seq(Min, Min, Max))
    assert(c.dominates(t(1, 4, 7), t(1, 5, 7)))
  }

  test("DIFF: unequal DIFF values block dominance both ways") {
    val c = checker(Seq(Diff, Min))
    assert(!c.dominates(t(1, 1), t(2, 9)))
    assert(!c.dominates(t(2, 9), t(1, 1)))
    assert(c.dominates(t(2, 1), t(2, 9)))
  }

  test("DIFF-only dimensions admit no dominance at all") {
    val c = checker(Seq(Diff, Diff))
    assert(!c.dominates(t(1, 1), t(1, 1)))
    assert(!c.dominates(t(1, 1), t(1, 2)))
  }

  test("mixed MIN/MAX/DIFF") {
    val c = checker(Seq(Min, Max, Diff))
    assert(c.dominates(t(1, 9, 5), t(2, 8, 5)))
    assert(!c.dominates(t(1, 9, 5), t(2, 8, 6))) // diff mismatch
  }

  test("complete dominance is transitive (randomized)") {
    val rnd = new Random(1)
    val c = checker(Seq(Min, Max, Min, Diff))
    val tuples = Seq.fill(60)(t(rnd.nextInt(4), rnd.nextInt(4), rnd.nextInt(4), rnd.nextInt(2)))
    for (a <- tuples; b <- tuples; cc <- tuples) {
      if (c.dominates(a, b) && c.dominates(b, cc)) {
        assert(c.dominates(a, cc), s"transitivity violated: ${a.toSeq} ${b.toSeq} ${cc.toSeq}")
      }
    }
  }

  test("complete dominance is antisymmetric (randomized)") {
    val rnd = new Random(2)
    val c = checker(Seq(Min, Max))
    val tuples = Seq.fill(80)(t(rnd.nextInt(5), rnd.nextInt(5)))
    for (a <- tuples; b <- tuples) {
      assert(!(c.dominates(a, b) && c.dominates(b, a)), s"cycle of length 2: ${a.toSeq} ${b.toSeq}")
    }
  }

  // ---- data types (the "no casting" requirement) -----------------------

  test("LongType dimensions") {
    val c = checker(Seq(Min), types = Seq(LongType))
    assert(c.dominates(t(1L), t(2L)))
  }

  test("DoubleType dimensions") {
    val c = checker(Seq(Max), types = Seq(DoubleType))
    assert(c.dominates(t(2.5), t(1.5)))
    assert(!c.dominates(t(1.5), t(2.5)))
  }

  test("FloatType dimensions") {
    val c = checker(Seq(Min), types = Seq(FloatType))
    assert(c.dominates(t(1.0f), t(2.0f)))
  }

  test("ShortType and ByteType dimensions") {
    val c = checker(Seq(Min, Max), types = Seq(ShortType, ByteType))
    assert(c.dominates(t(1.toShort, 3.toByte), t(2.toShort, 2.toByte)))
  }

  test("StringType dimensions compare lexicographically") {
    val c = checker(Seq(Min), types = Seq(StringType))
    assert(c.dominates(t(UTF8String.fromString("apple")), t(UTF8String.fromString("pear"))))
  }

  test("BooleanType dimensions (false < true)") {
    val c = checker(Seq(Max), types = Seq(BooleanType))
    assert(c.dominates(t(true), t(false)))
  }

  test("DateType dimensions (internal int days)") {
    val c = checker(Seq(Min), types = Seq(DateType))
    assert(c.dominates(t(18000), t(19000)))
  }

  test("DecimalType dimensions") {
    val c = checker(Seq(Min), types = Seq(DecimalType(10, 2)))
    assert(c.dominates(
      t(org.apache.spark.sql.types.Decimal("1.10")),
      t(org.apache.spark.sql.types.Decimal("1.20"))))
  }

  // ---- incomplete semantics (§3) ---------------------------------------

  test("incomplete: null dimensions are skipped") {
    val c = checker(Seq(Min, Min), incomplete = true)
    assert(c.dominates(t(1, null), t(2, 0))) // only d1 compared
    assert(c.dominates(t(1, 0), t(2, null)))
  }

  test("incomplete: strict win must be on a mutually non-null dimension") {
    val c = checker(Seq(Min, Min), incomplete = true)
    assert(!c.dominates(t(1, null), t(1, 5))) // ties on d1, d2 skipped
    assert(!c.dominates(t(null, null), t(1, 5)))
  }

  test("incomplete: all-null tuple neither dominates nor is dominated") {
    val c = checker(Seq(Min, Max), incomplete = true)
    assert(!c.dominates(t(null, null), t(1, 1)))
    assert(!c.dominates(t(1, 1), t(null, null)))
  }

  test("incomplete: DIFF applies only where both non-null") {
    val c = checker(Seq(Diff, Min), incomplete = true)
    assert(c.dominates(t(null, 1), t(7, 2)))  // diff skipped
    assert(!c.dominates(t(5, 1), t(7, 2)))    // diff mismatch blocks
  }

  test("paper cycle a<b<c<a (Section 3 example)") {
    val c = checker(Seq(Min, Min, Min), incomplete = true)
    val a = t(1, null, 10)
    val b = t(3, 2, null)
    val cc = t(null, 5, 3)
    assert(c.dominates(a, b))
    assert(c.dominates(b, cc))
    assert(c.dominates(cc, a))
    assert(!c.dominates(a, cc)) // transitivity is lost
  }

  test("complete-mode fallback on dirty data: nulls sort first, deterministic") {
    val c = checker(Seq(Min))
    assert(c.dominates(t(null), t(1)))  // null is "smallest"
    assert(!c.dominates(t(1), t(null)))
    val cMax = checker(Seq(Max))
    assert(cMax.dominates(t(1), t(null)))
  }

  // ---- helpers ---------------------------------------------------------

  test("equalOnDims: exact ties, null ties with null") {
    val c = checker(Seq(Min, Max))
    assert(c.equalOnDims(t(1, 2), t(1, 2)))
    assert(!c.equalOnDims(t(1, 2), t(1, 3)))
    assert(c.equalOnDims(t(null, 2), t(null, 2)))
    assert(!c.equalOnDims(t(null, 2), t(1, 2)))
  }

  test("nullBitmap encodes null positions") {
    val c = checker(Seq(Min, Max, Min))
    assert(c.nullBitmap(t(1, 2, 3)) == 0)
    assert(c.nullBitmap(t(null, 2, 3)) == 1)
    assert(c.nullBitmap(t(1, null, 3)) == 2)
    assert(c.nullBitmap(t(null, 2, null)) == 5)
    assert(c.nullBitmap(t(null, null, null)) == 7)
  }

  test("incomplete and complete agree on null-free tuples (randomized)") {
    val rnd = new Random(3)
    val ci = checker(Seq(Min, Max, Diff), incomplete = true)
    val cc = checker(Seq(Min, Max, Diff), incomplete = false)
    val tuples = Seq.fill(50)(t(rnd.nextInt(4), rnd.nextInt(4), rnd.nextInt(2)))
    for (a <- tuples; b <- tuples) {
      assert(ci.dominates(a, b) == cc.dominates(a, b))
    }
  }
}
