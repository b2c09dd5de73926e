package repro.jobs

import repro.bench.{BenchConfig, BenchUtil, MetaTables}

/** spark-submit entrypoint regenerating Table 1 (dataset catalog summary). */
object Table1Job {
  def main(args: Array[String]): Unit =
    BenchUtil.report("table1_datasets", MetaTables.table1(BenchConfig.catalog))
}
