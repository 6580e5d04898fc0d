package repro.mpi

import repro.core._

/** MpiExchange (paper §3.3.3, §4.1): histogram-driven, synchronization-free
  * network partitioning.
  *
  * Protocol (identical to the monolithic join of Barthels et al.):
  *  1. consume the local and global histograms from the two dedicated
  *     upstreams; allgather the local ones so every rank knows its exclusive
  *     write offset into each partition region;
  *  2. create one RMA window sized to hold exactly the partitions this rank
  *     owns (`owner(p) = p mod nRanks`);
  *  3. re-read the main upstream, route each tuple with `partOf`, buffer it
  *     in a per-partition write-combining batch (optionally radix-compressed
  *     at write time), and flush full batches with one-sided puts;
  *  4. fence, then emit ⟨npid, partitionData⟩ pairs over zero-copy slices of
  *     the local window region.
  */
final class MpiExchange(
    data: SubOp,
    localHist: SubOp,
    globalHist: SubOp,
    nPart: Int,
    partOf: Array[Any] => Int,
    ctx: MpiContext,
    compress: Compression = Compression.none,
    batchRows: Int = 1024,
    phase: String = "networkPartition",
    ownerShift: Int = 0,
) extends SubOp {
  private val elemT: TupleType =
    if (compress.enabled) compress.outType else data.outType
  private val bytesPerTuple: Int = Bytes.perTuple(elemT)

  override val outType: TupleType =
    TupleType.of("npid" -> Atom.IntA, "data" -> CollectionType(elemT))

  // ownerShift rotates the partition→rank placement; a fresh exchange epoch
  // in an unoptimized plan has no reason to land partitions on the ranks of
  // a previous epoch (the naive join-sequence plan of Fig 4 re-shuffles its
  // intermediate result through the network for exactly this reason).
  private def ownerOf(p: Int): Int = (p + ownerShift) % ctx.nRanks

  private var owned: Vector[Array[Any]] = _
  private var i = 0

  override def open(): Unit = {
    val lh = Histograms.toArray(localHist, nPart)
    val gh = Histograms.toArray(globalHist, nPart)
    owned = ctx.timer.time(phase) { exchange(lh, gh) }
    i = 0
  }

  private def exchange(lh: Array[Long], gh: Array[Long]): Vector[Array[Any]] = {
    val n = ctx.nRanks
    // Every rank's local histogram: counts(rank)(partition).
    val counts = ctx.allGather(lh)

    // Layout of each owner's window: owned partitions in increasing id,
    // each region exactly the global partition size.
    val partBase = new Array[Int](nPart)
    val winSizePerRank = new Array[Int](n)
    var p = 0
    while (p < nPart) {
      val o = ownerOf(p)
      partBase(p) = winSizePerRank(o)
      winSizePerRank(o) += gh(p).toInt
      p += 1
    }
    val win = ctx.winCreate(winSizePerRank(ctx.rank))

    // Exclusive write cursor per partition: base + sum of lower ranks' counts.
    val cursor = new Array[Int](nPart)
    p = 0
    while (p < nPart) {
      var off = partBase(p)
      var r = 0
      while (r < ctx.rank) { off += counts(r)(p).toInt; r += 1 }
      cursor(p) = off
      p += 1
    }

    // Write-combining batches, flushed by one-sided puts (paper §4.1.1).
    val batches = Array.fill(nPart)(new Array[Array[Any]](batchRows))
    val fill    = new Array[Int](nPart)

    def flush(p: Int): Unit = {
      val len = fill(p)
      if (len > 0) {
        ctx.put(win, ownerOf(p), cursor(p), batches(p), len, len.toLong * bytesPerTuple)
        cursor(p) += len
        fill(p) = 0
        batches(p) = new Array[Array[Any]](batchRows)
      }
    }

    data.open()
    var t = data.next()
    while (t != null) {
      val pid = partOf(t)
      val out = if (compress.enabled) compress.pack(t, pid) else t
      batches(pid)(fill(pid)) = out
      fill(pid) += 1
      if (fill(pid) == batchRows) flush(pid)
      t = data.next()
    }
    data.close()
    p = 0
    while (p < nPart) { flush(p); p += 1 }

    ctx.fence(win)

    val mine = win.local(ctx.rank)
    (0 until nPart).filter(ownerOf(_) == ctx.rank).map { pid =>
      Array[Any](
        pid,
        new RowSlice(mine, partBase(pid), gh(pid).toInt): RowVec,
      )
    }.toVector
  }

  override def next(): Array[Any] =
    if (i >= owned.size) null
    else { val t = owned(i); i += 1; t }

  override def close(): Unit = owned = null
}

/** Radix compression for the network phase (paper §4.1.1): with identity-hash
  * radix partitioning over dense long domains, the low F partition bits of
  * the key are constant within a partition and can be dropped; key-high-bits
  * and payload are packed into one 64-bit word, halving wire bytes. The
  * dropped bits are recovered downstream by a ParametrizedMap fed the
  * networkPartitionID.
  */
final class Compression private (
    val enabled: Boolean,
    val outType: TupleType,
    val pack: (Array[Any], Int) => Array[Any],
)

object Compression {
  val none: Compression = new Compression(false, null, null)

  /** Pack ⟨k: long, v: long⟩ into ⟨c: long⟩ with `c = ((k >>> fBits) << pBits) | v`;
    * requires `v < 2^pBits` and `k < 2^(64 - pBits + fBits)`.
    */
  def radixLongPair(fBits: Int, pBits: Int = 32): Compression =
    new Compression(
      enabled = true,
      outType = TupleType.of("c" -> Atom.LongA),
      pack = (t, _) => {
        val k = t(0).asInstanceOf[Long]
        val v = t(1).asInstanceOf[Long]
        Array[Any](((k >>> fBits) << pBits) | v)
      },
    )

  /** Decompression helpers matching [[radixLongPair]]. */
  def keyHi(c: Long, pBits: Int): Long = c >>> pBits
  def value(c: Long, pBits: Int): Long = c & ((1L << pBits) - 1)
  def restoreKey(keyHi: Long, npid: Int, fBits: Int): Long = (keyHi << fBits) | npid
}
