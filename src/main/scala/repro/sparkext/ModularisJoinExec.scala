package repro.sparkext

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.{
  Attribute, BindReferences, Expression, UnsafeProjection}
import org.apache.spark.sql.catalyst.plans.{Inner, JoinType, LeftAnti, LeftSemi}
import org.apache.spark.sql.catalyst.plans.physical.{ClusteredDistribution, Distribution}
import org.apache.spark.sql.execution.{BinaryExecNode, SparkPlan}
import org.apache.spark.sql.types.DataType

import repro.core._

/** The Modularis distributed join ported to the Spark platform (the
  * heterogeneous-platform claim of §1/§5.1.1): Catalyst's shuffle exchange
  * plays the role of MpiExchange (both children require
  * `ClusteredDistribution` on the join keys, so `EnsureRequirements` inserts
  * co-partitioning exchanges), the per-partition task plays the role of the
  * MpiExecutor nested plan, and inside the task the *unchanged* core
  * sub-operators (IterSource → BuildProbe) do the work. Only the "network
  * operators" changed — exactly the paper's porting story.
  */
case class ModularisJoinExec(
    leftKeys: Seq[Expression],
    rightKeys: Seq[Expression],
    joinType: JoinType,
    left: SparkPlan,
    right: SparkPlan,
) extends BinaryExecNode {
  require(leftKeys.nonEmpty && leftKeys.size == rightKeys.size)

  override def output: Seq[Attribute] = joinType match {
    case Inner               => left.output ++ right.output
    case LeftSemi | LeftAnti => left.output
    case t => throw new IllegalArgumentException(s"unsupported join type $t")
  }

  override def requiredChildDistribution: Seq[Distribution] =
    ClusteredDistribution(leftKeys) :: ClusteredDistribution(rightKeys) :: Nil

  override protected def withNewChildrenInternal(
      newLeft: SparkPlan, newRight: SparkPlan): SparkPlan =
    copy(left = newLeft, right = newRight)

  override protected def doExecute(): RDD[InternalRow] = {
    val lTypes = left.output.map(_.dataType).toArray
    val rTypes = right.output.map(_.dataType).toArray
    val lBoundKeys = leftKeys.map(BindReferences.bindReference(_, left.output))
    val rBoundKeys = rightKeys.map(BindReferences.bindReference(_, right.output))
    val nKeys = leftKeys.size
    val outTypes = output.map(_.dataType).toArray
    val jt = joinType

    left.execute().zipPartitions(right.execute()) { (lIter, rIter) =>
      // Tuple layout per side: ⟨k0..kJ, c0..cN⟩ (synthetic key fields first,
      // then all columns — join keys may be expressions over columns).
      val keyAtoms  = leftKeys.zipWithIndex
        .map { case (e, i) => s"k$i" -> (RowCodec.atomOf(e.dataType): ItemType) }.toVector
      val lType = TupleType(keyAtoms ++
        left.output.zipWithIndex.map { case (a, i) =>
          s"l$i" -> (RowCodec.atomOf(a.dataType): ItemType) }.toVector)
      val rType = TupleType(keyAtoms ++
        right.output.zipWithIndex.map { case (a, i) =>
          s"r$i" -> (RowCodec.atomOf(a.dataType): ItemType) }.toVector)

      def tuples(
          it: Iterator[InternalRow],
          keys: Seq[Expression],
          types: Array[DataType],
      ): Iterator[Array[Any]] = it.map { raw =>
        val row = raw.copy()
        val t = new Array[Any](nKeys + types.length)
        var i = 0
        keys.foreach { k => t(i) = k.eval(row); i += 1 }
        val cols = RowCodec.toTuple(row, types)
        System.arraycopy(cols, 0, t, nKeys, cols.length)
        t
      }

      val lSrc = new IterSource(() => tuples(lIter, lBoundKeys, lTypes), lType)
      val rSrc = new IterSource(() => tuples(rIter, rBoundKeys, rTypes), rType)
      val attrs = (0 until nKeys).map(i => s"k$i")

      // LeftSemi/LeftAnti preserve the LEFT side: the left is the probe and
      // the right the build, mirroring the BuildProbe variants of §5.1.1.
      val bp = jt match {
        case Inner    => new BuildProbe(lSrc, rSrc, attrs, JoinKind.Inner)
        case LeftSemi => new BuildProbe(rSrc, lSrc, attrs, JoinKind.Semi)
        case LeftAnti => new BuildProbe(rSrc, lSrc, attrs, JoinKind.Anti)
        case t        => throw new IllegalStateException(s"unsupported join type $t")
      }

      val toUnsafe = UnsafeProjection.create(outTypes)
      jt match {
        case Inner =>
          // BuildProbe output: ⟨k*, lcols*, rcols*⟩ → project off the keys.
          RowCodec.iterate(bp).map { t =>
            toUnsafe(RowCodec.toRow(t, nKeys, lTypes.length + rTypes.length))
          }
        case _ =>
          // Semi/Anti output: the probe (left) tuple ⟨k*, lcols*⟩.
          RowCodec.iterate(bp).map(t => toUnsafe(RowCodec.toRow(t, nKeys, lTypes.length)))
      }
    }
  }
}
