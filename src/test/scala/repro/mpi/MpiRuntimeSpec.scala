package repro.mpi

import org.scalatest.funsuite.AnyFunSuite

class MpiRuntimeSpec extends AnyFunSuite {

  test("run returns per-rank results in rank order") {
    val rt = new MpiRuntime(4)
    assert(rt.run(ctx => ctx.rank * 10) == Vector(0, 10, 20, 30))
  }

  test("barrier synchronizes all ranks") {
    val rt = new MpiRuntime(4)
    val flags = new java.util.concurrent.atomic.AtomicInteger(0)
    val results = rt.run { ctx =>
      flags.incrementAndGet()
      ctx.barrier()
      flags.get() // after barrier every rank must see all increments
    }
    assert(results.forall(_ == 4))
  }

  test("allGather returns every rank's contribution in rank order") {
    val rt = new MpiRuntime(3)
    val results = rt.run(ctx => ctx.allGather(java.lang.Integer.valueOf(ctx.rank)))
    results.foreach(v => assert(v.map(_.intValue) == Vector(0, 1, 2)))
  }

  test("repeated collectives do not interfere") {
    val rt = new MpiRuntime(3)
    val results = rt.run { ctx =>
      val a = ctx.allGather(java.lang.Integer.valueOf(ctx.rank))
      val b = ctx.allGather(java.lang.Integer.valueOf(ctx.rank + 100))
      (a.map(_.intValue), b.map(_.intValue))
    }
    results.foreach { case (a, b) =>
      assert(a == Vector(0, 1, 2))
      assert(b == Vector(100, 101, 102))
    }
  }

  test("allReduceSum sums element-wise on every rank") {
    val rt = new MpiRuntime(4)
    val results = rt.run(ctx => ctx.allReduceSum(Array(1L, ctx.rank.toLong)))
    results.foreach(v => assert(v.toSeq == Seq(4L, 6L)))
  }

  test("windows: puts to exclusive offsets are visible after fence") {
    val n = 4
    val rt = new MpiRuntime(n)
    val results = rt.run { ctx =>
      val win = ctx.winCreate(n) // each rank receives one row from each rank
      val batch = Array(Array[Any](ctx.rank.toLong))
      var target = 0
      while (target < n) {
        ctx.put(win, target, ctx.rank, batch, 1, 8)
        target += 1
      }
      ctx.fence(win)
      win.local(ctx.rank).map(_(0).asInstanceOf[Long]).toSeq
    }
    results.foreach(v => assert(v == Seq(0L, 1L, 2L, 3L)))
  }

  test("network stats: cross-machine vs local byte accounting") {
    val cfg = NetConfig(ranksPerMachine = 2, crossBytesPerSec = Long.MaxValue, msgLatencyNanos = 0)
    val rt = new MpiRuntime(4, cfg)
    rt.run { ctx =>
      val win = ctx.winCreate(4)
      val batch = Array(Array[Any](0L))
      var t = 0
      while (t < 4) { ctx.put(win, t, ctx.rank, batch, 1, 100); t += 1 }
      ctx.fence(win)
    }
    val stats = rt.lastContexts.map(_.stats)
    // 4 ranks on 2 machines: each rank sends 2 local (same machine) + 2 cross.
    stats.foreach { s =>
      assert(s.bytesLocal == 200)
      assert(s.bytesCross == 200)
      assert(s.msgs == 4)
    }
  }

  test("machineOf groups ranks") {
    val cfg = NetConfig(ranksPerMachine = 2)
    assert(Seq(0, 1, 2, 3).map(cfg.machineOf) == Seq(0, 0, 1, 1))
  }

  test("rank failure propagates to the driver and releases peers") {
    val rt = new MpiRuntime(3)
    val e = intercept[Throwable] {
      rt.run { ctx =>
        if (ctx.rank == 1) throw new RuntimeException("rank 1 died")
        ctx.barrier()
      }
    }
    def causes(t: Throwable): Seq[Throwable] =
      Seq(t) ++ Option(t.getCause).toSeq.flatMap(causes)
    assert(causes(e).exists(_.getMessage != null) )
  }

  test("single-rank runtime works without peers") {
    val rt = new MpiRuntime(1)
    val r = rt.run { ctx =>
      val win = ctx.winCreate(1)
      ctx.put(win, 0, 0, Array(Array[Any](42L)), 1, 8)
      ctx.fence(win)
      ctx.allReduceSum(Array(5L)).toSeq
    }
    assert(r == Vector(Seq(5L)))
  }

  test("PhaseTimer accumulates and maxAcross takes per-phase maxima") {
    val t1 = new PhaseTimer; val t2 = new PhaseTimer
    t1.add("a", 100); t1.add("a", 50); t2.add("a", 300); t2.add("b", 10)
    assert(t1.nanos("a") == 150)
    val m = PhaseTimer.maxAcross(Seq(t1, t2))
    assert(m("a") == 300 && m("b") == 10)
  }

  test("simulated wire time accrues for cross-machine puts") {
    val cfg = NetConfig(ranksPerMachine = 1, crossBytesPerSec = 1_000_000L, msgLatencyNanos = 1000)
    val rt = new MpiRuntime(2, cfg)
    rt.run { ctx =>
      val win = ctx.winCreate(2)
      ctx.put(win, 1 - ctx.rank, ctx.rank, Array(Array[Any](0L)), 1, 1_000_000L)
      ctx.fence(win)
    }
    rt.lastContexts.foreach(c => assert(c.stats.simulatedWireNanos >= 1_000_000_000L))
  }
}
