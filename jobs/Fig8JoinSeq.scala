package repro.jobs

/** spark-submit entrypoint for the Fig 8 join-sequence benchmark.
  * Knobs: REPRO_JOINSEQ_ROWS (default 1M).
  */
object Fig8JoinSeq {
  def main(args: Array[String]): Unit = repro.bench.JoinSeqBench.main(args)
}
