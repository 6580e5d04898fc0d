package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import BenchUtil._

/** Fig 8: sequences of joins — naive vs optimized.
  * Paper shape: constant speedup of the optimized plan at fixed output
  * (8a); naive grows linearly with the first join's output while the
  * optimized network time stays constant (8b/8c); the gap grows with the
  * number of joins (8d).
  */
class Fig8JoinSeqBench extends AnyFunSuite {
  private val n = envInt("REPRO_JOINSEQ_ROWS", 1_000_000)

  test("Fig 8a — naive vs optimized across machines") {
    println(JoinSeqBench.fig8a(n, Seq(2, 4, 8)))
  }

  test("Fig 8b/8c — runtime and network cost vs join output size") {
    println(JoinSeqBench.fig8bc(n, 8, Seq(1, 2, 3, 4)))
  }

  test("Fig 8d — runtime vs number of joins") {
    println(JoinSeqBench.fig8d(n, 8, Seq(2, 3, 4)))
  }

  test("shape: optimized shuffles fewer bytes and its network bytes stay flat") {
    val o1 = JoinSeqBench.runOnce(n / 4, 4, 3, 1, optimized = true)
    val v1 = JoinSeqBench.runOnce(n / 4, 4, 3, 1, optimized = false)
    assert(v1.bytes > o1.bytes, "naive must shuffle more bytes (2N vs N+1 exchanges)")
    val o4 = JoinSeqBench.runOnce(n / 4, 4, 3, 4, optimized = true)
    val v4 = JoinSeqBench.runOnce(n / 4, 4, 3, 4, optimized = false)
    assert(o4.bytes == o1.bytes,
      "optimized shuffles only the base relations — independent of join output")
    assert(v4.bytes > v1.bytes,
      "naive shuffles the growing intermediate — bytes grow with join output")
  }
}
