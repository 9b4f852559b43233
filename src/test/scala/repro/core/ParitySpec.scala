package repro.core

import repro.SparkSpec
import repro.core.api._
import repro.data.SkylineData
import repro.reference.BruteForce
import scala.util.Random

/** Randomized parity sweep: for many random dimension subsets and flag
  * combinations, the SQL path, the DataFrame API and the brute-force oracle
  * must agree. This is the breadth counterpart to the targeted suites.
  */
class ParitySpec extends SparkSpec {

  private lazy val data = {
    val df = SkylineData.airbnb(spark, 600, nullFraction = 0.15).cache()
    df.createOrReplaceTempView("parity_air")
    df.count()
    df
  }

  private val rnd = new Random(2023)

  private def randomDims(): Seq[(String, Direction)] = {
    val k = 1 + rnd.nextInt(4)
    val picked = rnd.shuffle(SkylineData.airbnbDims).take(k)
    // randomly flip one direction to DIFF now and then (but keep at least
    // one MIN/MAX so dominance exists)
    if (picked.size > 1 && rnd.nextBoolean())
      picked.updated(0, picked.head._1 -> Direction.Diff)
    else picked
  }

  for (round <- 1 to 12) {
    val dims = randomDims()
    val label = dims.map { case (n, d) => s"$n ${d.sql}" }.mkString(", ")

    test(s"parity #$round: SQL == API == brute force for [$label]") {
      data // force lazy init: registers the parity_air view
      val viaSql = spark.sql(s"SELECT * FROM parity_air SKYLINE OF $label")
        .collect().toSeq
      val viaApi = data.skyline(
        dims.map { case (n, d) => SkylineColumn(data(n), d) }: _*).collect().toSeq
      val expected = BruteForce.skyline(
        data.collect().toSeq, TestUtil.dimIndices(data, dims), incomplete = true)
      TestUtil.assertSameRows(viaApi, viaSql, "SQL vs API")
      TestUtil.assertSameRows(viaApi, expected, "API vs brute force")
    }
  }

  for (round <- 1 to 4) {
    val dims = randomDims()
    val label = dims.map { case (n, d) => s"$n ${d.sql}" }.mkString(", ")

    test(s"parity #$round DISTINCT: SQL and API agree on combinations [$label]") {
      data // force lazy init: registers the parity_air view
      val idx = TestUtil.dimIndices(data, dims).map(_._1)
      def keys(rows: Seq[org.apache.spark.sql.Row]) =
        TestUtil.canon(rows.map(r => org.apache.spark.sql.Row.fromSeq(idx.map(r.get))))
      val viaSql = spark.sql(s"SELECT * FROM parity_air SKYLINE OF DISTINCT $label")
        .collect().toSeq
      val viaApi = data.skylineDistinct(
        dims.map { case (n, d) => SkylineColumn(data(n), d) }: _*).collect().toSeq
      assert(keys(viaSql) == keys(viaApi))
      val expected = BruteForce.skyline(data.collect().toSeq,
        TestUtil.dimIndices(data, dims), incomplete = true, distinct = true)
      assert(keys(viaApi) == keys(expected))
    }
  }
}
