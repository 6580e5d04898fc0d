package repro.plans

import scala.collection.mutable.ArrayBuffer
import scala.util.Random

import repro.core._

/** Generators for the paper's join/group-by microbenchmark workloads
  * (§5.1.2): relations of 16-byte ⟨8 B key, 8 B payload⟩ tuples with dense
  * keys from a compressible domain and (by default) a 1-on-1 key
  * correspondence between inner and outer relation. Scaled down from the
  * paper's 2048 M tuples (DESIGN.md substitution table).
  */
object Workloads {
  val PairType: TupleType = TupleType.of("k" -> Atom.LongA, "v" -> Atom.LongA)

  def pairTypeNamed(valueName: String): TupleType =
    TupleType.of("k" -> Atom.LongA, valueName -> Atom.LongA)

  /** `n` tuples over `n / dup` dense keys, each key occurring `dup` times,
    * in shuffled order; payloads are dense in `[0, n)` (so they fit the
    * radix-compression packing).
    */
  def densePairs(n: Int, dup: Int = 1, seed: Long = 42): Array[Array[Any]] = {
    val nKeys = math.max(1, n / dup)
    val rows  = new Array[Array[Any]](n)
    var i = 0
    while (i < n) {
      rows(i) = Array[Any]((i % nKeys).toLong, i.toLong)
      i += 1
    }
    val rnd = new Random(seed)
    // Fisher–Yates so the partitioning phase sees unsorted input.
    i = n - 1
    while (i > 0) {
      val j = rnd.nextInt(i + 1)
      val t = rows(i); rows(i) = rows(j); rows(j) = t
      i -= 1
    }
    rows
  }

  /** Round-robin shard into per-rank RowVectors (each rank "reads its part
    * of the input", §4.1.1).
    */
  def shard(rows: Array[Array[Any]], nRanks: Int): Vector[RowVec] = {
    val parts = Vector.fill(nRanks)(new ArrayBuffer[Array[Any]](rows.length / nRanks + 1))
    var i = 0
    while (i < rows.length) {
      parts(i % nRanks) += rows(i)
      i += 1
    }
    parts.map(b => b: RowVec)
  }

  /** Reference join for correctness checks (hash join on field 0). */
  def referenceJoin(
      r: Seq[Array[Any]],
      s: Seq[Array[Any]],
  ): Map[(Long, Long, Long), Int] = {
    val byKey = r.groupBy(_(0).asInstanceOf[Long])
    val out   = scala.collection.mutable.HashMap.empty[(Long, Long, Long), Int]
    s.foreach { st =>
      val k = st(0).asInstanceOf[Long]
      byKey.getOrElse(k, Nil).foreach { rt =>
        val key = (k, rt(1).asInstanceOf[Long], st(1).asInstanceOf[Long])
        out.update(key, out.getOrElse(key, 0) + 1)
      }
    }
    out.toMap
  }

  /** Reference group-by-sum for correctness checks. */
  def referenceGroupSum(rows: Seq[Array[Any]]): Map[Long, Long] =
    rows
      .groupBy(_(0).asInstanceOf[Long])
      .map { case (k, vs) => k -> vs.map(_(1).asInstanceOf[Long]).sum }
}
