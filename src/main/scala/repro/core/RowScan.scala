package repro.core

import scala.collection.mutable.ArrayBuffer

/** RowScan (paper §3.3.4): the basic input-reading operator — unnests a
  * RowVector collection field of the upstream tuples, emitting the contained
  * tuples one at a time (across all upstream tuples).
  */
final class RowScan(up: SubOp, field: String) extends SubOp {
  private val idx = up.outType.indexOf(field)
  override val outType: TupleType = up.outType.typeOf(field) match {
    case CollectionType(elem) => elem
    case other => throw new IllegalArgumentException(
      s"RowScan field '$field' is not a collection: ${other.render}")
  }

  private var cur: RowVec = _
  private var i = 0

  override def open(): Unit = { up.open(); cur = null; i = 0 }

  override def next(): Array[Any] = {
    while (true) {
      if (cur != null && i < cur.length) {
        val t = cur(i); i += 1
        return t
      }
      val ut = up.next()
      if (ut == null) return null
      cur = ut(idx).asInstanceOf[RowVec]
      i = 0
    }
    null // unreachable
  }

  override def close(): Unit = { up.close(); cur = null }
}

/** MaterializeRowVector (paper §3.3.4): collects the upstream into a single
  * tuple holding one RowVector collection — the counterpart of RowScan and
  * the required final operator of every nested plan. Always emits exactly
  * one tuple (possibly with an empty collection).
  */
final class MaterializeRowVector(up: SubOp, field: String = "data") extends SubOp {
  override val outType: TupleType =
    TupleType.of(field -> CollectionType(up.outType))
  private var result: Array[Any] = _
  private var emitted = false

  override def open(): Unit = {
    val buf = up.drain()
    result = Array[Any](buf: RowVec)
    emitted = false
  }

  override def next(): Array[Any] =
    if (emitted) null else { emitted = true; result }

  override def close(): Unit = result = null
}

/** Materialization point for multi-consumer DAG edges (paper §3.2 pipeline
  * cutting): the wrapped operator runs once per plan invocation; each
  * consumer obtains an independent replay scan over the buffered result.
  *
  * Invocation tracking: plans are constructed once but nested plans are
  * re-opened per NestedMap input tuple, so the cache must refresh when a new
  * invocation starts. Each consumer opens exactly once per invocation
  * (Volcano discipline), so the first of every `consumerCount` opens
  * re-materializes and the rest replay. All consumers must be obtained via
  * [[scan]] before the first open.
  */
final class Shared(up: SubOp) {
  private var buf: ArrayBuffer[Array[Any]] = _
  private var consumers = 0
  private var opens = 0
  private var sealedConsumers = false

  def scan: SubOp = {
    require(!sealedConsumers, "all Shared consumers must be created before the first open")
    consumers += 1
    new SubOp {
      override val outType: TupleType = up.outType
      private var i = 0
      override def open(): Unit = {
        sealedConsumers = true
        if (opens % consumers == 0) buf = up.drain()
        opens += 1
        i = 0
      }
      override def next(): Array[Any] = {
        val b = buf
        if (i >= b.size) null else { val t = b(i); i += 1; t }
      }
      override def close(): Unit = ()
      override def render: String = s"SharedScan(${up.render})"
    }
  }

  def consumerCount: Int = consumers
}
