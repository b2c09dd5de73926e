package repro.jobs

import repro.bench.{BenchConfig, BenchUtil, ExactSearchBench}

/** spark-submit entrypoint regenerating the §6.5 exact-search QPS table. */
object ExactSearchJob {
  def main(args: Array[String]): Unit =
    BenchUtil.report("exact_search_qps",
                     ExactSearchBench.run(BenchConfig.exactSearchSpecs)._1)
}
