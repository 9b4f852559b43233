package repro.core

import org.apache.spark.sql.catalyst.analysis.UnresolvedAttribute
import org.scalatest.funsuite.AnyFunSuite

/** Light-weight properties of the logical building blocks. */
class NodePropertiesSpec extends AnyFunSuite {

  private def dim(name: String, d: Direction) =
    SkylineDimension(UnresolvedAttribute(name), d)

  test("Direction.fromString accepts any case") {
    assert(Direction.fromString("min").contains(Direction.Min))
    assert(Direction.fromString("Max").contains(Direction.Max))
    assert(Direction.fromString("DIFF").contains(Direction.Diff))
  }

  test("Direction.fromString rejects junk") {
    assert(Direction.fromString("ASC").isEmpty)
    assert(Direction.fromString("").isEmpty)
  }

  test("Direction sql text round-trips") {
    Direction.all.foreach(d => assert(Direction.fromString(d.sql).contains(d)))
  }

  test("SkylineDimension keeps its child's data type and nullability") {
    import org.apache.spark.sql.catalyst.expressions.Literal
    val d = SkylineDimension(Literal(1), Direction.Min)
    assert(d.dataType == org.apache.spark.sql.types.IntegerType)
    assert(!d.nullable)
  }

  test("SkylineDimension withNewChildInternal replaces the child") {
    import org.apache.spark.sql.catalyst.expressions.Literal
    val d = dim("a", Direction.Max)
    val d2 = d.withNewChildren(Seq(Literal(2))).asInstanceOf[SkylineDimension]
    assert(d2.child == Literal(2) && d2.direction == Direction.Max)
  }

  test("SkylineDimension sql/toString mention the direction") {
    assert(dim("a", Direction.Min).toString.contains("MIN"))
    assert(dim("a", Direction.Diff).sql.contains("DIFF"))
  }

  test("SkylineOperator requires at least one dimension") {
    val rel = org.apache.spark.sql.catalyst.plans.logical.OneRowRelation()
    intercept[IllegalArgumentException] {
      SkylineOperator(distinct = false, complete = false, Nil, rel)
    }
  }

  test("SkylineOperator output mirrors its child") {
    val rel = org.apache.spark.sql.catalyst.plans.logical.LocalRelation(
      org.apache.spark.sql.catalyst.expressions.AttributeReference(
        "x", org.apache.spark.sql.types.IntegerType)())
    val sky = SkylineOperator(distinct = false, complete = false,
      Seq(dim("x", Direction.Min)), rel)
    assert(sky.output == rel.output)
    assert(sky.maxRows == rel.maxRows)
  }

  test("SkylineOperator simpleString advertises flags and dimensions") {
    val rel = org.apache.spark.sql.catalyst.plans.logical.OneRowRelation()
    val s = SkylineOperator(distinct = true, complete = true,
      Seq(dim("a", Direction.Min)), rel).simpleString(10)
    assert(s.contains("DISTINCT") && s.contains("COMPLETE") && s.contains("MIN"))
  }

  test("SkylineOperator withNewChildInternal rewires the child") {
    val rel = org.apache.spark.sql.catalyst.plans.logical.OneRowRelation()
    val rel2 = org.apache.spark.sql.catalyst.plans.logical.LocalRelation(
      org.apache.spark.sql.catalyst.expressions.AttributeReference(
        "y", org.apache.spark.sql.types.IntegerType)())
    val sky = SkylineOperator(distinct = false, complete = false,
      Seq(dim("a", Direction.Min)), rel)
    assert(sky.withNewChildren(Seq(rel2)).children.head == rel2)
  }

  test("unresolved dimensions leave the operator unresolved") {
    val rel = org.apache.spark.sql.catalyst.plans.logical.OneRowRelation()
    val sky = SkylineOperator(distinct = false, complete = false,
      Seq(dim("nope", Direction.Min)), rel)
    assert(!sky.resolved)
  }
}
