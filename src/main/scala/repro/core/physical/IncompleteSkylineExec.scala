package repro.core.physical

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.{Attribute, IsNull}
import org.apache.spark.sql.catalyst.plans.physical.{AllTuples, ClusteredDistribution, Distribution, Partitioning}
import org.apache.spark.sql.execution.{SparkPlan, UnaryExecNode}
import repro.core.{SkylineAlgorithms, SkylineDimension}

/** Local-skyline node for (potentially) incomplete data (§5.7).
  *
  * Requires a `ClusteredDistribution` on the null-indicators of the skyline
  * dimensions (`IsNull(dim)` per dimension) — the paper's bitmap
  * partitioning, crafted "using the predefined IsNull() method". All tuples
  * sharing a null bitmap land in the same partition; a partition may hold
  * several bitmap groups (hash assignment), so rows are re-grouped by their
  * exact bitmap before BNL. Within one bitmap group incomplete dominance is
  * transitive (identical null positions), so eager BNL deletion is safe;
  * cross-group dominance is deliberately left to the global node (Lemma 5.1).
  */
case class IncompleteLocalSkylineExec(
    dimensions: Seq[SkylineDimension],
    distinct: Boolean,
    child: SparkPlan)
    extends UnaryExecNode {

  override def output: Seq[Attribute] = child.output

  override def outputPartitioning: Partitioning = child.outputPartitioning

  override def requiredChildDistribution: Seq[Distribution] =
    ClusteredDistribution(dimensions.map(d => IsNull(d.child))) :: Nil

  override protected def doExecute(): RDD[InternalRow] = {
    val bound = SkylineExecUtil.bind(dimensions, child.output)
    val chk = SkylineExecUtil.checker(dimensions, incomplete = true)
    val dist = distinct
    child.execute().mapPartitionsWithIndex(
      { (idx, iter) =>
        SkylineExecUtil.initExprs(bound, idx)
        SkylineAlgorithms
          .bnlByNullBitmap(SkylineExecUtil.evaluated(iter, bound), chk, dist)
          .map(_._1)
      },
      preservesPartitioning = true)
  }

  override protected def withNewChildInternal(newChild: SparkPlan): IncompleteLocalSkylineExec =
    copy(child = newChild)
}

/** Global-skyline node for (potentially) incomplete data (§5.7, Appendix A).
  *
  * Incomplete dominance is not transitive and may be cyclic, so BNL's eager
  * deletion is unsound here. Instead all pairs are compared and dominated
  * tuples are only flagged; deletion happens after every pair has been seen.
  * This is the paper's correction of the Gulzar et al. algorithm — a
  * dominated tuple must still be allowed to eliminate the tuples *it*
  * dominates.
  */
case class IncompleteGlobalSkylineExec(
    dimensions: Seq[SkylineDimension],
    distinct: Boolean,
    child: SparkPlan)
    extends UnaryExecNode {

  override def output: Seq[Attribute] = child.output

  override def outputPartitioning: Partitioning = child.outputPartitioning

  override def requiredChildDistribution: Seq[Distribution] = AllTuples :: Nil

  override protected def doExecute(): RDD[InternalRow] = {
    val bound = SkylineExecUtil.bind(dimensions, child.output)
    val chk = SkylineExecUtil.checker(dimensions, incomplete = true)
    val dist = distinct
    child.execute().mapPartitionsWithIndex { (idx, iter) =>
      SkylineExecUtil.initExprs(bound, idx)
      SkylineAlgorithms
        .allPairsDeferred(
          SkylineExecUtil.evaluated(iter, bound).toIndexedSeq, chk, dist)
        .iterator
        .map(_._1)
    }
  }

  override protected def withNewChildInternal(newChild: SparkPlan): IncompleteGlobalSkylineExec =
    copy(child = newChild)
}
