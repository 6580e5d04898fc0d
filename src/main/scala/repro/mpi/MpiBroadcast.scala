package repro.mpi

import repro.core._

/** MpiBroadcast (paper §3.3.3): sends all tuples from the main upstream to
  * all ranks, using the same histogram-driven offset computation as
  * MpiExchange (each rank's region in every window starts at the prefix sum
  * of lower ranks' local counts) and returns the gathered tuples directly,
  * without partition IDs.
  *
  * The histograms here are single-bucket (`n = 1`): the local count and the
  * global total.
  */
final class MpiBroadcast(
    data: SubOp,
    localCount: SubOp,
    globalCount: SubOp,
    ctx: MpiContext,
    batchRows: Int = 1024,
    phase: String = "broadcast",
) extends SubOp {
  override val outType: TupleType = data.outType
  private val bytesPerTuple = Bytes.perTuple(data.outType)

  private var all: Array[Array[Any]] = _
  private var i = 0

  override def open(): Unit = {
    val lc = Histograms.toArray(localCount, 1)(0)
    val gc = Histograms.toArray(globalCount, 1)(0)
    all = ctx.timer.time(phase) {
      val counts = ctx.allGather(Array(lc))
      val win = ctx.winCreate(gc.toInt)
      var base = 0
      var r = 0
      while (r < ctx.rank) { base += counts(r)(0).toInt; r += 1 }

      val batch = new Array[Array[Any]](batchRows)
      var fill = 0
      var written = 0
      def flush(): Unit = if (fill > 0) {
        var t = 0
        while (t < ctx.nRanks) {
          ctx.put(win, t, base + written, batch, fill, fill.toLong * bytesPerTuple)
          t += 1
        }
        written += fill
        fill = 0
      }

      data.open()
      var t = data.next()
      while (t != null) {
        batch(fill) = t
        fill += 1
        if (fill == batchRows) flush()
        t = data.next()
      }
      data.close()
      flush()
      ctx.fence(win)
      win.local(ctx.rank)
    }
    i = 0
  }

  override def next(): Array[Any] =
    if (i >= all.length) null
    else { val t = all(i); i += 1; t }

  override def close(): Unit = all = null
}
