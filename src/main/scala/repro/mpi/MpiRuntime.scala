package repro.mpi

import java.util.concurrent.locks.LockSupport

/** SPMD runtime simulating an MPI job over RDMA (paper §2): ranks are JVM
  * threads, collectives are barrier-based, and RMA windows are pre-sized
  * shared row arrays with exclusive write regions per sender — the same
  * synchronization structure as `MPI_Win_create` / `MPI_Put` /
  * `MPI_Win_fence` used by the monolithic join of Barthels et al.
  *
  * All collectives must be called by every rank in the same global order
  * (the MPI contract); a shared exchange board plus two barriers per
  * collective implements allGather, from which allReduce derives.
  */
/** Thrown on ranks that were blocked in a collective when a peer failed. */
final class PeerFailedException(cause: Throwable)
    extends IllegalStateException("a peer rank failed during a collective", cause)

/** Sense-counting barrier that aborts waiters when a peer has failed: every
  * waiter polls the runtime's failure flag, so a dead rank can never leave
  * the cluster deadlocked in a collective (the simulator's analog of an MPI
  * job abort).
  */
private[mpi] final class AbortableBarrier(n: Int, failed: () => Throwable) {
  private var generation = 0L
  private var waiting = 0

  def await(): Unit = synchronized {
    val f0 = failed()
    if (f0 != null) throw new PeerFailedException(f0)
    val gen = generation
    waiting += 1
    if (waiting == n) {
      waiting = 0
      generation += 1
      notifyAll()
    } else {
      while (generation == gen) {
        wait(25)
        if (generation == gen) {
          val f = failed()
          if (f != null) { waiting -= 1; throw new PeerFailedException(f) }
        }
      }
    }
  }
}

final class MpiRuntime(val nRanks: Int, val cfg: NetConfig = NetConfig()) {
  require(nRanks >= 1)
  @volatile private var failure: Throwable = _
  private val barrier = new AbortableBarrier(nRanks, () => failure)
  private val board   = new Array[AnyRef](nRanks)

  /** Run `body` on every rank concurrently; returns per-rank results in rank
    * order. The first rank failure is rethrown on the driver; peers blocked
    * on a collective abort via [[PeerFailedException]].
    */
  def run[A](body: MpiContext => A): Vector[A] = {
    val results  = new Array[Any](nRanks)
    val contexts = Vector.tabulate(nRanks)(r => new MpiContext(r, this))
    lastContexts = contexts
    val threads = (0 until nRanks).map { r =>
      val t = new Thread(
        () =>
          try results(r) = body(contexts(r))
          catch {
            case e: PeerFailedException => () // primary failure already recorded
            case e: Throwable           => if (failure == null) failure = e
          },
        s"mpi-rank-$r"
      )
      t.setDaemon(true)
      t
    }
    threads.foreach(_.start())
    threads.foreach(_.join())
    if (failure != null) {
      val f = failure
      failure = null
      throw f
    }
    Vector.tabulate(nRanks)(r => results(r).asInstanceOf[A])
  }

  /** Contexts of the most recent run — benches read timers/stats from here. */
  @volatile var lastContexts: Vector[MpiContext] = Vector.empty

  private[mpi] def sync(): Unit = barrier.await()

  private[mpi] def exchange[T <: AnyRef](rank: Int, v: T): Vector[T] = {
    board(rank) = v
    sync()
    val out = Vector.tabulate(nRanks)(i => board(i).asInstanceOf[T])
    sync() // board may be reused by the next collective only after all read
    out
  }
}

/** An RMA window: every rank's registered region, globally visible. Writers
  * copy rows into exclusive offset ranges (computed from histograms), so no
  * synchronization is needed between fences — the paper's one-sided-write
  * discipline.
  */
final class Window(val regions: Vector[Array[Array[Any]]]) {
  def local(rank: Int): Array[Array[Any]] = regions(rank)
}

/** Per-rank handle to the runtime: rank id, collectives, RMA verbs, timers
  * and network statistics.
  */
final class MpiContext(val rank: Int, val runtime: MpiRuntime) {
  val timer = new PhaseTimer
  val stats = new NetStats
  private var pendingWireNanos = 0L

  def nRanks: Int = runtime.nRanks
  def cfg: NetConfig = runtime.cfg

  def barrier(): Unit = runtime.sync()

  /** MPI_Allgather of one reference per rank. */
  def allGather[T <: AnyRef](v: T): Vector[T] = runtime.exchange(rank, v)

  /** MPI_Allreduce(SUM) over a long vector (the paper's global-histogram
    * primitive). Every rank receives the element-wise sum.
    */
  def allReduceSum(a: Array[Long]): Array[Long] = {
    val all = allGather(a)
    val out = new Array[Long](a.length)
    all.foreach { v =>
      var i = 0
      while (i < v.length) { out(i) += v(i); i += 1 }
    }
    out
  }

  /** Collective window creation (MPI_Win_create): every rank registers a
    * region of `localRows` rows; all regions become globally addressable.
    */
  def winCreate(localRows: Int): Window =
    new Window(allGather(new Array[Array[Any]](localRows)))

  /** One-sided write of `len` rows from `batch` into `target`'s region at
    * `offset`. `bytes` is the modeled wire size of the batch; cross-machine
    * transfers accumulate simulated wire time, paid at the next fence.
    */
  def put(win: Window, target: Int, offset: Int, batch: Array[Array[Any]], len: Int, bytes: Long): Unit = {
    System.arraycopy(batch, 0, win.regions(target), offset, len)
    stats.msgs += 1
    if (cfg.machineOf(target) != cfg.machineOf(rank)) {
      stats.bytesCross += bytes
      val nanos = (bytes * 1e9 / cfg.crossBytesPerSec).toLong + cfg.msgLatencyNanos
      pendingWireNanos += nanos
      stats.simulatedWireNanos += nanos
    } else stats.bytesLocal += bytes
  }

  /** MPI_Win_fence: pays accumulated simulated wire time, then synchronizes
    * the RMA epoch (all outstanding puts complete at all ranks).
    */
  def fence(win: Window): Unit = {
    if (pendingWireNanos > 0) {
      LockSupport.parkNanos(pendingWireNanos)
      pendingWireNanos = 0
    }
    runtime.sync()
  }
}
