package repro.jobs

/** Entrypoint for the Table 1 implementation-effort report. */
object Table1Sloc {
  def main(args: Array[String]): Unit = repro.bench.SlocCount.main(args)
}
