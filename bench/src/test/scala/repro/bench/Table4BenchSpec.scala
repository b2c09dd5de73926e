package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 4: speedup of the auto-vectorized PDX kernels (L2, IP, L1) vs the
  * horizontal baseline, grouped by dimensionality. The paper reports
  * 1.5–7.4x depending on D and ISA; the shape assertion here is that PDX
  * never loses badly anywhere and wins most at low D.
  */
class Table4BenchSpec extends AnyFunSuite {

  test("Table 4: PDX vs horizontal kernel speedups") {
    val (table, cells) = KernelBench.table4(BenchConfig.kernelDs, BenchConfig.kernelSizes)
    BenchUtil.report("table4_kernel_speedups", table)

    for (metric <- Seq("L2", "IP", "L1")) {
      val all = cells((metric, "All"))
      val d8 = cells((metric, "D=8"))
      val big = cells((metric, "D>32"))
      assert(all > 0.9, s"$metric overall speedup $all — PDX should not lose overall")
      assert(d8 >= big * 0.9, s"$metric: low-D advantage missing (D=8 $d8 vs D>32 $big)")
      assert(d8 > 1.0, s"$metric D=8 speedup $d8")
    }
  }
}
