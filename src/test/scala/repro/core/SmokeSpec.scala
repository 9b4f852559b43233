package repro.core

import repro.SparkSpec

/** Fast end-to-end sanity checks: extension installed, SQL path works. */
class SmokeSpec extends SparkSpec {

  test("skyline extension is installed in the shared session") {
    assert(
      spark.sessionState.sqlParser.isInstanceOf[repro.core.parser.SkylineSqlParser],
      "expected -Dspark.sql.extensions=repro.core.SkylineExtensions to be active")
  }

  test("hotel example from the paper (Listing 2)") {
    import spark.implicits._
    Seq(
      (1, 100.0, 7.0), // dominated by hotel 3
      (2, 50.0, 6.0),
      (3, 80.0, 9.0),
      (4, 120.0, 9.5),
      (5, 50.0, 8.0), // dominates hotel 2
    ).toDF("id", "price", "user_rating").createOrReplaceTempView("hotels")
    val out = spark
      .sql("SELECT price, user_rating FROM hotels SKYLINE OF price MIN, user_rating MAX")
      .collect()
      .map(r => (r.getDouble(0), r.getDouble(1)))
      .toSet
    assert(out == Set((50.0, 8.0), (80.0, 9.0), (120.0, 9.5)))
  }

  test("non-skyline SQL is untouched") {
    assert(spark.sql("SELECT 1 + 1 AS two").collect().head.getInt(0) == 2)
  }
}
