package repro.jobs

/** spark-submit entrypoint for the Fig 7 GROUP BY benchmark.
  * Knobs: REPRO_GROUPBY_ROWS (default 2M).
  */
object Fig7GroupBy {
  def main(args: Array[String]): Unit = repro.bench.GroupByBench.main(args)
}
