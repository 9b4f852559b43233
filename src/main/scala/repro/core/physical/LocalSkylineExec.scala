package repro.core.physical

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.Attribute
import org.apache.spark.sql.catalyst.plans.physical.{Distribution, Partitioning, UnspecifiedDistribution}
import org.apache.spark.sql.execution.{SparkPlan, UnaryExecNode}
import repro.core.{SkylineAlgorithms, SkylineDimension}

/** Distributed local-skyline node for complete data (§5.5–5.6).
  *
  * Runs Block-Nested-Loop independently inside every input partition and
  * emits each partition's local skyline. Distribution is left unspecified —
  * exactly the paper's choice: whatever partitioning the child produced is
  * kept, preserving locality and avoiding an extra shuffle.
  */
case class LocalSkylineExec(
    dimensions: Seq[SkylineDimension],
    distinct: Boolean,
    child: SparkPlan)
    extends UnaryExecNode {

  override def output: Seq[Attribute] = child.output

  override def outputPartitioning: Partitioning = child.outputPartitioning

  override def requiredChildDistribution: Seq[Distribution] =
    UnspecifiedDistribution :: Nil

  override protected def doExecute(): RDD[InternalRow] = {
    val bound = SkylineExecUtil.bind(dimensions, child.output)
    val chk = SkylineExecUtil.checker(dimensions, incomplete = false)
    val dist = distinct
    child.execute().mapPartitionsWithIndex(
      { (idx, iter) =>
        SkylineExecUtil.initExprs(bound, idx)
        SkylineAlgorithms
          .bnl(SkylineExecUtil.evaluated(iter, bound), chk, dist)
          .iterator
          .map(_._1)
      },
      preservesPartitioning = true)
  }

  override protected def withNewChildInternal(newChild: SparkPlan): LocalSkylineExec =
    copy(child = newChild)
}
