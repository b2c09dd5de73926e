package repro.jobs

import repro.bench.{BenchConfig, BenchUtil, KernelBench}

/** spark-submit entrypoint regenerating Table 5 (block-size sweep). */
object Table5Job {
  def main(args: Array[String]): Unit =
    BenchUtil.report("table5_block_sizes",
                     KernelBench.table5(BenchConfig.blockDs, BenchConfig.blockSizes)._1)
}
