package repro.jobs

import repro.bench.{BenchUtil, MetaTables}

/** spark-submit entrypoint regenerating Table 3 (hardware platform row). */
object Table3Job {
  def main(args: Array[String]): Unit =
    BenchUtil.report("table3_hardware", MetaTables.table3())
}
