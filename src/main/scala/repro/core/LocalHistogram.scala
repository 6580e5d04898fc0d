package repro.core

/** LocalHistogram (paper §3.3.2): maps each upstream tuple to a bucket in
  * `[0, n)` and counts occurrences; emits `n` ⟨bucket, count⟩ tuples in
  * bucket order (including empty buckets — MpiExchange/LocalPartitioning
  * rely on receiving exactly `n` rows).
  */
final class LocalHistogram(up: SubOp, n: Int, bucketOf: Array[Any] => Int) extends SubOp {
  require(n > 0, "histogram needs at least one bucket")
  override val outType: TupleType =
    TupleType.of("bucket" -> Atom.IntA, "count" -> Atom.LongA)

  private var counts: Array[Long] = _
  private var i = 0

  override def open(): Unit = {
    val c = new Array[Long](n)
    up.open()
    var t = up.next()
    while (t != null) {
      val b = bucketOf(t)
      require(b >= 0 && b < n, s"bucket $b out of range [0,$n)")
      c(b) += 1
      t = up.next()
    }
    up.close()
    counts = c
    i = 0
  }

  override def next(): Array[Any] =
    if (i >= n) null
    else { val t = Array[Any](i, counts(i)); i += 1; t }

  override def close(): Unit = counts = null
}

object Histograms {
  /** Drain a ⟨bucket,count⟩ operator into a dense array of length `n`. */
  def toArray(op: SubOp, n: Int): Array[Long] = {
    val out  = new Array[Long](n)
    val rows = op.drain()
    require(rows.size == n, s"histogram operator produced ${rows.size} rows, expected $n")
    rows.foreach { r => out(r(0).asInstanceOf[Int]) = r(1).asInstanceOf[Long] }
    out
  }
}
