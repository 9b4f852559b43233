package repro.data

import repro.SparkSpec

/** Generator sanity: determinism, schema, null fractions, correlations. */
class SkylineDataSpec extends SparkSpec {

  test("airbnb generator is deterministic in (rows, seed)") {
    val a = SkylineData.airbnb(spark, 500).collect().map(_.toString).sorted
    val b = SkylineData.airbnb(spark, 500).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("airbnb has the Table 1 schema") {
    val cols = SkylineData.airbnb(spark, 10).columns.toSeq
    assert(cols == Seq("id", "price", "accommodates", "bedrooms", "beds",
      "number_of_reviews", "review_scores_rating"))
  }

  test("airbnb complete variant has no nulls and non-nullable dims") {
    val df = SkylineData.airbnb(spark, 1000)
    SkylineData.airbnbDims.foreach { case (c, _) =>
      assert(!df.schema(c).nullable, s"$c should be non-nullable")
      assert(df.where(s"$c IS NULL").count() == 0)
    }
  }

  test("airbnb incomplete variant concentrates nulls in the trailing dims") {
    val df = SkylineData.airbnb(spark, 5000, nullFraction = 0.2)
    val nullable = SkylineData.nullableDims(SkylineData.airbnbDims)
    nullable.foreach { c =>
      val frac = df.where(s"$c IS NULL").count().toDouble / 5000
      assert(frac > 0.1 && frac < 0.5, s"$c null fraction $frac")
    }
    SkylineData.airbnbDims.map(_._1).filterNot(nullable.contains).foreach { c =>
      assert(df.where(s"$c IS NULL").count() == 0, s"$c should stay null-free")
    }
  }

  test("airbnb value ranges are plausible") {
    val df = SkylineData.airbnb(spark, 2000)
    val r = df.selectExpr("min(price)", "max(price)", "min(accommodates)",
      "max(accommodates)").collect().head
    assert(r.getDouble(0) >= 20 && r.getDouble(1) <= 500)
    assert(r.getInt(2) >= 1 && r.getInt(3) <= 16)
  }

  test("store_sales has the Table 2 schema") {
    val cols = SkylineData.storeSales(spark, 10).columns.toSeq
    assert(cols == Seq("ss_item_sk", "ss_ticket_number", "ss_quantity",
      "ss_wholesale_cost", "ss_list_price", "ss_sales_price",
      "ss_ext_discount_amt", "ss_ext_sales_price"))
  }

  test("store_sales price columns are correlated (list >= wholesale, sales <= list)") {
    val df = SkylineData.storeSales(spark, 2000)
    assert(df.where("ss_list_price < ss_wholesale_cost").count() == 0)
    assert(df.where("ss_sales_price > ss_list_price").count() == 0)
  }

  test("store_sales quantity lives on a small domain (dim-1 tie feature)") {
    val df = SkylineData.storeSales(spark, 5000)
    val distinctQ = df.select("ss_quantity").distinct().count()
    assert(distinctQ <= 100)
    // many rows attain the max → 1-dim MAX skyline is large
    val maxQ = df.selectExpr("max(ss_quantity)").collect().head.getInt(0)
    assert(df.where(s"ss_quantity = $maxQ").count() > 10)
  }

  test("store_sales incomplete variant sprinkles nulls in the nullable dims") {
    val df = SkylineData.storeSales(spark, 3000, nullFraction = 0.15)
    SkylineData.nullableDims(SkylineData.storeSalesDims).foreach { c =>
      assert(df.where(s"$c IS NULL").count() > 0, c)
    }
  }

  test("musicBrainz produces three joinable tables") {
    val (rec, meta, track) = SkylineData.musicBrainz(spark, 500)
    assert(rec.count() == 500 && meta.count() == 500)
    assert(track.count() == 1000)
    val joined = rec.join(meta, "id")
    assert(joined.count() == 500)
    // some recordings have no tracks (left-outer exercise)
    val withTracks = track.select("recording").distinct().count()
    assert(withTracks < 500)
  }

  test("musicBrainz incomplete variant has nulls in rating dimensions") {
    val (_, meta, _) = SkylineData.musicBrainz(spark, 1000, nullFraction = 0.2)
    assert(meta.where("rating IS NULL").count() > 0)
  }
}
