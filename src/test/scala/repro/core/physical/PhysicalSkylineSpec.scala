package repro.core.physical

import org.apache.spark.sql.execution.SparkPlan
import repro.SparkSpec
import repro.core.{Direction, SkylineConf, TestUtil}
import repro.core.api._
import repro.data.SkylineData

/** Execution tests for the skyline physical operators: every forced
  * algorithm against the definitional brute-force oracle, on complete and
  * incomplete data, plus plan-shape assertions (Listing 8).
  */
class PhysicalSkylineSpec extends SparkSpec {

  import Direction._

  private def nodes(df: org.apache.spark.sql.DataFrame): Seq[SparkPlan] =
    TestUtil.executedNodes(df)

  private def airbnbC = SkylineData.airbnb(spark, 2000, nullFraction = 0.0)
  private def airbnbI = SkylineData.airbnb(spark, 2000, nullFraction = 0.15)
  private val dims6 = SkylineData.airbnbDims
  private val dims3 = SkylineData.airbnbDims.take(3)
  private val dims2 = SkylineData.airbnbDims.take(2)

  // ---- correctness: every algorithm vs. brute force --------------------

  for (algo <- Seq("auto", "distributed-complete", "non-distributed-complete",
                   "distributed-incomplete")) {
    test(s"$algo matches brute force on complete Airbnb data, 2–6 dims") {
      for (d <- Seq(dims2, dims3, dims6)) {
        TestUtil.assertMatchesBrute(airbnbC, d, algo,
          incomplete = algo == "distributed-incomplete")
      }
    }
  }

  for (algo <- Seq("auto", "distributed-incomplete")) {
    test(s"$algo matches brute force on incomplete Airbnb data (nulls)") {
      // use dimension sets that include the null-bearing trailing columns
      for (d <- Seq(SkylineData.airbnbDims.drop(4), SkylineData.airbnbDims.drop(2))) {
        TestUtil.assertMatchesBrute(airbnbI, d, algo, incomplete = true)
      }
    }
  }

  test("store_sales: all algorithms agree with brute force (3 dims)") {
    val df = SkylineData.storeSales(spark, 1500)
    for (algo <- Seq("distributed-complete", "non-distributed-complete",
                     "distributed-incomplete")) {
      TestUtil.assertMatchesBrute(df, SkylineData.storeSalesDims.take(3), algo,
        incomplete = algo == "distributed-incomplete")
    }
  }

  test("store_sales incomplete: distributed-incomplete matches brute force") {
    val df = SkylineData.storeSales(spark, 1500, nullFraction = 0.2)
    TestUtil.assertMatchesBrute(df, SkylineData.storeSalesDims.drop(2),
      "distributed-incomplete", incomplete = true)
  }

  // ---- DISTINCT --------------------------------------------------------

  test("DISTINCT keeps one tuple per dimension combination (complete)") {
    import spark.implicits._
    // (9,4) is incomparable with (10,5): cheaper but lower-rated
    val df = Seq((1, 10, 5), (2, 10, 5), (3, 10, 5), (4, 9, 4))
      .toDF("id", "price", "rating")
    val dims = Seq("price" -> Min, "rating" -> Max)
    for (algo <- Seq("distributed-complete", "non-distributed-complete")) {
      TestUtil.assertMatchesBrute(df, dims, algo, incomplete = false, distinct = true)
      val n = TestUtil.skylineWith(df, dims, algo, distinct = true).rows.size
      assert(n == 2, s"$algo: one representative per combination expected")
    }
  }

  test("DISTINCT on incomplete data") {
    import spark.implicits._
    val df = Seq(
      (1, Some(10), Some(5)), (2, Some(10), Some(5)),
      (3, None, Some(7)), (4, None, Some(7)),
    ).toDF("id", "price", "rating")
    val dims = Seq("price" -> Min, "rating" -> Max)
    TestUtil.assertMatchesBrute(df, dims, "distributed-incomplete",
      incomplete = true, distinct = true)
  }

  // ---- incomplete-data pitfalls (§3, Appendix A) -----------------------

  test("paper cycle: skyline of {a,b,c} with cyclic dominance is empty") {
    import spark.implicits._
    val df = Seq(
      (Option(1), Option.empty[Int], Option(10)),
      (Option(3), Option(2), Option.empty[Int]),
      (Option.empty[Int], Option(5), Option(3)),
    ).toDF("d1", "d2", "d3")
    val dims = Seq("d1" -> Min, "d2" -> Min, "d3" -> Min)
    assert(TestUtil.skylineWith(df, dims, "distributed-incomplete").rows.isEmpty)
    assert(TestUtil.skylineWith(df, dims, "auto").rows.isEmpty)
  }

  test("auto mode picks the incomplete algorithm for nullable dimensions") {
    val ns = nodes(airbnbI.skyline(smin("price"), smax("accommodates")))
    assert(ns.exists(_.isInstanceOf[IncompleteGlobalSkylineExec]))
    assert(ns.exists(_.isInstanceOf[IncompleteLocalSkylineExec]))
  }

  test("auto mode picks the complete algorithm for non-nullable dimensions") {
    val ns = nodes(airbnbC.skyline(smin("price"), smax("accommodates")))
    assert(ns.exists(_.isInstanceOf[GlobalSkylineExec]))
    assert(ns.exists(_.isInstanceOf[LocalSkylineExec]))
  }

  test("COMPLETE keyword forces the complete algorithm on nullable schema") {
    val ns = nodes(
      airbnbI.na.drop().skylineComplete(smin("price"), smax("accommodates")))
    assert(ns.exists(_.isInstanceOf[GlobalSkylineExec]))
  }

  test("COMPLETE on actually-complete-but-nullable data is correct") {
    val df = airbnbI.na.drop("any", SkylineData.airbnbDims.map(_._1)).cache()
    try {
      val got = df.skylineComplete(
        smin("price"), smax("accommodates"), smax("bedrooms")).collect().toSeq
      val exp = repro.reference.BruteForce.skyline(
        df.collect().toSeq, TestUtil.dimIndices(df, dims3), incomplete = false)
      TestUtil.assertSameRows(got, exp)
    } finally { df.unpersist(); () }
  }

  // ---- plan shapes (Listing 8) -----------------------------------------

  test("distributed-complete plans local + global pair") {
    val run = TestUtil.skylineWith(airbnbC, dims3, "distributed-complete")
    val global = run.nodes.collectFirst { case g: GlobalSkylineExec => g }
    assert(global.nonEmpty)
    assert(TestUtil.allPhysicalNodes(global.get)
      .exists(_.isInstanceOf[LocalSkylineExec]),
      "local skyline must feed the global one")
  }

  test("non-distributed-complete plans global only") {
    val ns = TestUtil.skylineWith(airbnbC, dims3, "non-distributed-complete").nodes
    assert(!ns.exists(_.isInstanceOf[LocalSkylineExec]))
    assert(ns.exists(_.isInstanceOf[GlobalSkylineExec]))
  }

  test("distributed-incomplete plans bitmap local + deferred global pair") {
    val ns = TestUtil.skylineWith(airbnbI, dims3, "distributed-incomplete").nodes
    assert(ns.exists(_.isInstanceOf[IncompleteLocalSkylineExec]))
    assert(ns.exists(_.isInstanceOf[IncompleteGlobalSkylineExec]))
  }

  test("local skyline preserves the number of input partitions") {
    val df = airbnbC.repartition(7)
    val run = TestUtil.skylineWith(df, dims3, "distributed-complete")
    val local = run.nodes.collectFirst { case l: LocalSkylineExec => l }.get
    assert(local.execute().getNumPartitions == 7)
  }

  test("skyline output schema equals input schema") {
    val out = airbnbC.skyline(smin("price"), smax("beds"))
    assert(out.schema == airbnbC.schema)
  }

  test("empty input yields empty skyline in every algorithm") {
    val empty = airbnbC.where("price < 0")
    for (algo <- Seq("distributed-complete", "non-distributed-complete",
                     "distributed-incomplete")) {
      assert(TestUtil.skylineWith(empty, dims2, algo).rows.isEmpty, algo)
    }
  }

  test("single row survives in every algorithm") {
    val one = airbnbC.limit(1)
    for (algo <- Seq("distributed-complete", "non-distributed-complete",
                     "distributed-incomplete")) {
      assert(TestUtil.skylineWith(one, dims6, algo).rows.size == 1, algo)
    }
  }

  test("all-identical rows: all survive without DISTINCT, one with") {
    import spark.implicits._
    val df = Seq.fill(20)((5, 5)).toDF("a", "b")
    val dims = Seq("a" -> Min, "b" -> Max)
    assert(TestUtil.skylineWith(df, dims, "distributed-complete").rows.size == 20)
    assert(TestUtil.skylineWith(df, dims, "distributed-complete", distinct = true).rows.size == 1)
  }

  test("string dimension skyline") {
    import spark.implicits._
    val df = Seq(("a", 1), ("b", 1), ("a", 2)).toDF("s", "v")
    val out = TestUtil.skylineWith(df, Seq("s" -> Min, "v" -> Max),
      "distributed-complete").rows.map(r => (r.getString(0), r.getInt(1))).toSet
    assert(out == Set(("a", 2)))
  }

  test("date dimension skyline") {
    import spark.implicits._
    import java.sql.Date
    val df = Seq(
      (Date.valueOf("2020-01-01"), 1),
      (Date.valueOf("2021-01-01"), 2),
      (Date.valueOf("2020-06-01"), 2),
    ).toDF("d", "v")
    TestUtil.assertMatchesBrute(df, Seq("d" -> Min, "v" -> Max),
      "distributed-complete", incomplete = false)
  }

  test("expression dimension (arithmetic over columns)") {
    import spark.implicits._
    val df = Seq((10, 2), (6, 8), (4, 4)).toDF("a", "b")
    val out = df.skyline(smin(df("a") + df("b")))
    assert(out.collect().map(r => (r.getInt(0), r.getInt(1))).toSet == Set((4, 4)))
  }

  test("forced incomplete algorithm on complete data is correct (slow path)") {
    TestUtil.assertMatchesBrute(airbnbC, dims3, "distributed-incomplete",
      incomplete = true)
  }

  test("many partitions vs one partition give the same skyline") {
    val base = SkylineData.airbnb(spark, 3000)
    val a = TestUtil.skylineWith(base.repartition(16), dims3, "distributed-complete")
    val b = TestUtil.skylineWith(base.coalesce(1), dims3, "distributed-complete")
    TestUtil.assertSameRows(a.rows, b.rows)
  }
}
