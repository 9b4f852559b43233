package repro.core.physical

import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.{Attribute, BindReferences, Expression, Nondeterministic}
import repro.core.{DominanceChecker, SkylineDimension}

/** Shared plumbing for the skyline physical operators: binding the dimension
  * expressions against the child output and evaluating them per row.
  */
private[core] object SkylineExecUtil {

  /** Bind each dimension's expression to child output ordinals (driver side;
    * the bound expressions are serialized into the task closures).
    */
  def bind(dims: Seq[SkylineDimension], childOutput: Seq[Attribute]): Array[Expression] =
    dims.map(d => BindReferences.bindReference(d.child, childOutput)).toArray

  /** Dominance checker matched to the dimensions' exact data types. */
  def checker(dims: Seq[SkylineDimension], incomplete: Boolean): DominanceChecker =
    new DominanceChecker(
      dims.map(_.child.dataType).toArray,
      dims.map(_.direction).toArray,
      incomplete)

  /** Per-partition initialization for nondeterministic dimension
    * expressions (e.g. rand() as a skyline dimension).
    */
  def initExprs(bound: Array[Expression], partitionIndex: Int): Unit =
    bound.foreach(_.foreach {
      case n: Nondeterministic => n.initialize(partitionIndex)
      case _                   =>
    })

  /** Materialize the incoming rows as (owned copy, dim values). The copy is
    * mandatory: unsafe rows are reused by the upstream iterator, and both the
    * BNL window and the evaluated values (UTF8String slices, Decimals) alias
    * the row buffer.
    */
  def evaluated(
      iter: Iterator[InternalRow],
      bound: Array[Expression]): Iterator[(InternalRow, Array[Any])] =
    iter.map { row =>
      val owned = row.copy()
      val vals = new Array[Any](bound.length)
      var i = 0
      while (i < bound.length) {
        vals(i) = bound(i).eval(owned)
        i += 1
      }
      (owned, vals)
    }
}
