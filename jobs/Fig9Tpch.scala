package repro.jobs

/** spark-submit entrypoint for the Fig 9 TPC-H benchmark (Modularis vs
  * Spark SQL "MemSQL" vs Volcano-CSV "Presto").
  * Knobs: REPRO_TPCH_SF (default 0.1), SPARK_MASTER.
  */
object Fig9Tpch {
  def main(args: Array[String]): Unit = repro.bench.TpchBench.main(args)
}
