package repro.jobs

/** spark-submit entrypoint for the Fig 6 join benchmark (no Spark needed —
  * the simulated MPI cluster runs in-process; kept as a job for uniformity).
  * Knobs: REPRO_JOIN_ROWS (default 2M).
  */
object Fig6Join {
  def main(args: Array[String]): Unit = repro.bench.JoinBench.main(args)
}
