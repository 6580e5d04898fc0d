package repro.core

/** NestedMap (paper §3.3.1): executes a nested plan independently on each
  * input tuple; each invocation must produce exactly one output tuple
  * (typically a MaterializeRowVector result). The nested plan is built once
  * against a [[ParamSlot]] of the upstream's type and re-opened per input
  * tuple; its ParameterLookup operators read the slot.
  */
final class NestedMap(up: SubOp, buildInner: ParamSlot => SubOp) extends SubOp {
  private val slot  = new ParamSlot(up.outType)
  private val inner = buildInner(slot)
  override val outType: TupleType = inner.outType

  override def open(): Unit = up.open()

  override def next(): Array[Any] = {
    val t = up.next()
    if (t == null) return null
    slot.current = t
    inner.drainOne()
  }

  override def close(): Unit = up.close()
}
