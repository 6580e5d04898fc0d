package repro.core

import scala.collection.mutable.ArrayBuffer

/** Small helpers shared by the core unit tests. */
object TestData {
  val PairT: TupleType = TupleType.of("k" -> Atom.LongA, "v" -> Atom.LongA)

  def pairs(kvs: (Long, Long)*): RowVec = {
    val b = new ArrayBuffer[Array[Any]]()
    kvs.foreach { case (k, v) => b += Array[Any](k, v) }
    b
  }

  def src(kvs: (Long, Long)*): SubOp = new VectorSource(pairs(kvs: _*), PairT)

  def asPairs(rows: Seq[Array[Any]]): Seq[(Long, Long)] =
    rows.map(t => (t(0).asInstanceOf[Long], t(1).asInstanceOf[Long]))
}
