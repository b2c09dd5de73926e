package repro.jobs

import repro.bench.{BenchConfig, BenchUtil, KernelBench}

/** spark-submit entrypoint regenerating Table 4 (PDX kernel speedups). */
object Table4Job {
  def main(args: Array[String]): Unit =
    BenchUtil.report("table4_kernel_speedups",
                     KernelBench.table4(BenchConfig.kernelDs, BenchConfig.kernelSizes)._1)
}
