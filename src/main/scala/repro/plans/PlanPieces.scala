package repro.plans

import repro.core._
import repro.mpi._

/** Reusable plan fragments (the paper's whole point, §3.1): the same
  * sub-operator compositions recur across the distributed join, GROUP BY,
  * join sequences, and TPC-H plans. Conventions:
  *
  *  - every keyed stream has its 64-bit join/grouping key as field 0, named
  *    `"k"` (dense domain, so identity-hash radix partitioning applies);
  *  - network partition of a tuple = `k & (netFan-1)`; local partition =
  *    next `localBits` bits — identical for raw keys (`k >>> netBits`) and
  *    radix-compressed words (`keyHi & mask`).
  */
object PlanPieces {
  val id: SubOp => SubOp = s => s

  /** Shared knobs of every distributed plan in the paper's evaluation. */
  final case class DistConfig(
      nRanks: Int,
      net: NetConfig = NetConfig(),
      netBits: Int = 3,
      localBits: Int = 4,
      pBits: Int = 32,
      compress: Boolean = true,
      batchRows: Int = 1024,
  ) {
    require((1 << netBits) >= nRanks, s"netBits=$netBits gives fewer partitions than ranks=$nRanks")
    def netFan: Int = 1 << netBits
    def localFan: Int = 1 << localBits
    def compression: Compression =
      if (compress) Compression.radixLongPair(netBits, pBits) else Compression.none
  }

  /** `RowScan(Projection(ParameterLookup, field), field)` — dissect one
    * collection field of the enclosing scope's tuple into a row stream
    * (the PL→PR→RS motif of Figs 3 and 5).
    */
  def scanField(slot: ParamSlot, field: String): SubOp =
    new RowScan(new Projection(new ParameterLookup(slot), Seq(field)), field)

  /** Network partition function over a keyed stream (field 0 = long key). */
  def netPartOf(cfg: DistConfig): Array[Any] => Int =
    t => (t(0).asInstanceOf[Long] & (cfg.netFan - 1)).toInt

  /** Local (second-pass) partition function; operates on exchanged element
    * tuples — compressed words or raw keyed tuples.
    */
  def localPartOf(cfg: DistConfig, compressed: Boolean): Array[Any] => Int = {
    val mask = cfg.localFan - 1
    if (compressed) t => ((t(0).asInstanceOf[Long] >>> cfg.pBits) & mask).toInt
    else t => ((t(0).asInstanceOf[Long] >>> cfg.netBits) & mask).toInt
  }

  /** The paper's histogram-then-exchange pipeline (upper part of Fig 3):
    * Shared(keyed) → LocalHistogram → MpiHistogram → MpiExchange. The keyed
    * stream is materialized once (pipeline cut: it has two consumers).
    * Returns the ⟨npid, data⟩ stream of partitions owned by this rank.
    */
  def exchangePipeline(
      keyed: SubOp,
      ctx: MpiContext,
      cfg: DistConfig,
      compression: Compression,
      ownerShift: Int = 0,
  ): SubOp = {
    val netPart = netPartOf(cfg)
    val sh = new Shared(keyed)
    val lh = new Shared(
      new Timed(new LocalHistogram(sh.scan, cfg.netFan, netPart), ctx.timer, "localHistogram"))
    val gh = new MpiHistogram(lh.scan, cfg.netFan, ctx)
    new MpiExchange(sh.scan, lh.scan, gh, cfg.netFan, netPart, ctx,
      compression, cfg.batchRows, ownerShift = ownerShift)
  }

  /** The local partitioning motif inside the first NestedMap of Figs 3/5:
    * scan one partition's data, histogram + scatter it into `localFan`
    * sub-partitions, and re-attach the networkPartitionID via a
    * CartesianProduct (its left side is the single-tuple npid projection).
    * Output: ⟨npidField, lpidName, dataName⟩.
    */
  def localPartitionSide(
      slot1: ParamSlot,
      ctx: MpiContext,
      cfg: DistConfig,
      npidField: String,
      dataField: String,
      lpidName: String,
      dataName: String,
      compressed: Boolean,
  ): SubOp = {
    val part = localPartOf(cfg, compressed)
    val sh   = new Shared(scanField(slot1, dataField))
    val lh   = new LocalHistogram(sh.scan, cfg.localFan, part)
    val lp   = new Timed(
      new LocalPartitioning(sh.scan, lh, cfg.localFan, part), ctx.timer, "localPartition")
    new CartesianProduct(
      new Projection(new ParameterLookup(slot1), Seq(npidField)),
      new Rename(lp, Seq(lpidName, dataName)),
    )
  }

  /** Unpack radix-compressed words ⟨c⟩ into ⟨khi, valName⟩ (key high bits
    * still missing the partition bits, recovered later).
    */
  def splitCompressed(up: SubOp, valName: String, cfg: DistConfig): SubOp = {
    val pBits = cfg.pBits
    new MapOp(
      up,
      t => {
        val c = t(0).asInstanceOf[Long]
        Array[Any](Compression.keyHi(c, pBits), Compression.value(c, pBits))
      },
      TupleType.of("khi" -> Atom.LongA, valName -> Atom.LongA),
    )
  }

  /** Recover the partition bits dropped by the compression (ParametrizedMap
    * fed the networkPartitionID, §4.1.2): field 0 `khi` becomes the full key
    * `k`. Works on any stream whose field 0 is the compressed key-high word.
    */
  def restoreKeys(
      up: SubOp,
      slotWithNpid: ParamSlot,
      npidField: String,
      cfg: DistConfig,
  ): SubOp = {
    val netBits = cfg.netBits
    val outT = TupleType(("k" -> (Atom.LongA: ItemType)) +: up.outType.fields.tail)
    new ParametrizedMap(
      up,
      new Projection(new ParameterLookup(slotWithNpid), Seq(npidField)),
      (param, t) => {
        val out = t.clone()
        out(0) = Compression.restoreKey(
          t(0).asInstanceOf[Long], param(0).asInstanceOf[Int], netBits)
        out
      },
      outT,
    )
  }

  /** ⟨k, v⟩ long-pair sum combiner for ReduceByKey (key already stripped). */
  val sumLongValue: (Array[Any], Array[Any]) => Array[Any] =
    (a, b) => Array[Any](a(0).asInstanceOf[Long] + b(0).asInstanceOf[Long])
}
