package repro.monolith

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

import repro.core.{RowVec, TupleType}
import repro.mpi._

/** The monolithic, hand-fused distributed radix hash join in the style of
  * Barthels et al. [5, 6] — the baseline of Fig 6. One imperative function
  * per rank over the same simulated RDMA substrate ([[MpiRuntime]]) and the
  * same tuple representation as the modular plan, so the measured gap
  * isolates exactly what the paper measures: the cost of the sub-operator
  * abstractions (virtual next() calls, per-pipeline materializations,
  * NestedMap orchestration) versus fused loops.
  *
  * Phases (timed under the same names as the modular plan):
  * local histograms (both relations in one pass structure), one global
  * histogram epoch for both, network partitioning with write-combining
  * buffers + radix compression, local re-partitioning, build-probe with
  * key-bit recovery.
  */
object MonolithicRadixJoin {

  final case class Result(
      rows: ArrayBuffer[Array[Any]],
      timer: PhaseTimer,
      stats: NetStats,
  )

  /** Run the fused join of ⟨k,v⟩ relations `r ⋈ s` on one simulated cluster.
    * Returns per-rank materialized outputs ⟨k, rv, sv⟩.
    */
  def run(
      rParts: Vector[RowVec],
      sParts: Vector[RowVec],
      nRanks: Int,
      net: NetConfig,
      netBits: Int,
      localBits: Int,
      pBits: Int = 32,
      batchRows: Int = 1024,
  ): Vector[Result] = {
    require(rParts.size == nRanks && sParts.size == nRanks)
    val runtime = new MpiRuntime(nRanks, net)
    runtime.run { ctx =>
      val rows = joinOnRank(ctx, rParts(ctx.rank), sParts(ctx.rank),
        netBits, localBits, pBits, batchRows)
      Result(rows, ctx.timer, ctx.stats)
    }
  }

  private def joinOnRank(
      ctx: MpiContext,
      r: RowVec,
      s: RowVec,
      netBits: Int,
      localBits: Int,
      pBits: Int,
      batchRows: Int,
  ): ArrayBuffer[Array[Any]] = {
    val netFan  = 1 << netBits
    val netMask = netFan - 1
    val localFan  = 1 << localBits
    val localMask = localFan - 1
    val n = ctx.nRanks
    val bytesPerTuple = 8 // compressed 64-bit words on the wire

    // ---- Phase 1a: local histograms, both relations back to back. --------
    val (hr, hs) = ctx.timer.time("localHistogram") {
      val hr = new Array[Long](netFan)
      val hs = new Array[Long](netFan)
      var i = 0
      while (i < r.length) { val b = (r(i)(0).asInstanceOf[Long] & netMask).toInt; hr(b) = hr(b) + 1; i += 1 }
      i = 0
      while (i < s.length) { val b = (s(i)(0).asInstanceOf[Long] & netMask).toInt; hs(b) = hs(b) + 1; i += 1 }
      (hr, hs)
    }

    // ---- Phase 1b: global histograms — both allreduces adjacent, so the
    // collectives of the two relations run "almost at the same time" (§5.1.2).
    val (ghr, ghs) = ctx.timer.time("globalHistogram") {
      (ctx.allReduceSum(hr), ctx.allReduceSum(hs))
    }

    // ---- Phase 2: network partitioning with compression. -----------------
    val (rWin, sWin, rBase, sBase) = ctx.timer.time("networkPartition") {
      val cr = ctx.allGather(hr)
      val cs = ctx.allGather(hs)

      def layout(gh: Array[Long]): (Array[Int], Array[Int]) = {
        val partBase = new Array[Int](netFan)
        val sizePerRank = new Array[Int](n)
        var p = 0
        while (p < netFan) {
          val o = p % n
          partBase(p) = sizePerRank(o)
          sizePerRank(o) += gh(p).toInt
          p += 1
        }
        (partBase, sizePerRank)
      }
      val (rBase, rSizes) = layout(ghr)
      val (sBase, sSizes) = layout(ghs)
      val rWin = ctx.winCreate(rSizes(ctx.rank))
      val sWin = ctx.winCreate(sSizes(ctx.rank))

      def scatter(
          data: RowVec,
          counts: Vector[Array[Long]],
          base: Array[Int],
          win: Window,
      ): Unit = {
        val cursor = new Array[Int](netFan)
        var p = 0
        while (p < netFan) {
          var off = base(p)
          var rr = 0
          while (rr < ctx.rank) { off += counts(rr)(p).toInt; rr += 1 }
          cursor(p) = off
          p += 1
        }
        val batches = Array.fill(netFan)(new Array[Array[Any]](batchRows))
        val fill = new Array[Int](netFan)
        def flush(p: Int): Unit = {
          val len = fill(p)
          if (len > 0) {
            ctx.put(win, p % n, cursor(p), batches(p), len, len.toLong * bytesPerTuple)
            cursor(p) += len
            fill(p) = 0
            batches(p) = new Array[Array[Any]](batchRows)
          }
        }
        var i = 0
        while (i < data.length) {
          val t = data(i)
          val k = t(0).asInstanceOf[Long]
          val v = t(1).asInstanceOf[Long]
          val p2 = (k & netMask).toInt
          // write-combining buffer of compressed 64-bit words
          batches(p2)(fill(p2)) = Array[Any](((k >>> netBits) << pBits) | v)
          fill(p2) = fill(p2) + 1
          if (fill(p2) == batchRows) flush(p2)
          i += 1
        }
        p = 0
        while (p < netFan) { flush(p); p += 1 }
        ctx.fence(win)
      }
      scatter(r, cr, rBase, rWin)
      scatter(s, cs, sBase, sWin)
      (rWin, sWin, rBase, sBase)
    }

    val myParts = (0 until netFan).filter(_ % n == ctx.rank).toArray

    // ---- Phase 3: local re-partitioning (histogram + scatter fused). ------
    // Same boxed-row representation as the modular plan (compressed
    // single-field rows) so the comparison isolates abstraction overhead,
    // not data layout (DESIGN.md).
    type SubParts = Array[Array[Array[Any]]]
    def localRepartition(win: Window, base: Array[Int], gh: Array[Long]): Array[SubParts] =
      myParts.map { p =>
        val region = win.local(ctx.rank)
        val from = base(p)
        val len  = gh(p).toInt
        val hist = new Array[Int](localFan)
        var i = 0
        while (i < len) {
          val c = region(from + i)(0).asInstanceOf[Long]
          val b = ((c >>> pBits) & localMask).toInt
          hist(b) = hist(b) + 1
          i += 1
        }
        val out = Array.tabulate(localFan)(b => new Array[Array[Any]](hist(b)))
        val cur = new Array[Int](localFan)
        i = 0
        while (i < len) {
          val row = region(from + i)
          val c = row(0).asInstanceOf[Long]
          val b = ((c >>> pBits) & localMask).toInt
          out(b)(cur(b)) = row
          cur(b) += 1
          i += 1
        }
        out
      }

    val (rSub, sSub) = ctx.timer.time("localPartition") {
      (localRepartition(rWin, rBase, ghr), localRepartition(sWin, sBase, ghs))
    }

    // ---- Phase 4: build and probe per cache-sized sub-partition. ----------
    ctx.timer.time("buildProbe") {
      val out = new ArrayBuffer[Array[Any]]()
      val vMask = (1L << pBits) - 1
      var pi = 0
      while (pi < myParts.length) {
        val npid = myParts(pi)
        var b = 0
        while (b < localFan) {
          val rs = rSub(pi)(b)
          val ss = sSub(pi)(b)
          val table = new mutable.HashMap[Long, ArrayBuffer[Array[Any]]]()
          var i = 0
          while (i < rs.length) {
            val c = rs(i)(0).asInstanceOf[Long]
            table.getOrElseUpdate(c >>> pBits, new ArrayBuffer[Array[Any]](1)) += rs(i)
            i += 1
          }
          i = 0
          while (i < ss.length) {
            val c = ss(i)(0).asInstanceOf[Long]
            val khi = c >>> pBits
            table.get(khi) match {
              case Some(vs) =>
                val k = (khi << netBits) | npid
                val sv = c & vMask
                var j = 0
                while (j < vs.length) {
                  out += Array[Any](k, vs(j)(0).asInstanceOf[Long] & vMask, sv)
                  j += 1
                }
              case None =>
            }
            i += 1
          }
          b += 1
        }
        pi += 1
      }
      out
    }
  }

  /** Static output schema of the fused join (for oracle comparisons). */
  val OutType: TupleType = {
    import repro.core.Atom._
    TupleType.of("k" -> LongA, "rv" -> LongA, "sv" -> LongA)
  }

  /** Convenience: total output cardinality across ranks. */
  def totalRows(rs: Vector[Result]): Long = rs.map(_.rows.size.toLong).sum
}
