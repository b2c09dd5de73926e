package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 5: L2 PDX-kernel speedup per block size (paper: 64 best on every
  * ISA, degradation toward 16 and 512).
  */
class Table5BenchSpec extends AnyFunSuite {

  test("Table 5: block-size sweep") {
    val (table, cells) = KernelBench.table5(BenchConfig.blockDs, BenchConfig.blockSizes)
    BenchUtil.report("table5_block_sizes", table)

    // Loose shape: every block size still gains something vs N-ary, and the
    // mid-range (32..128) is not dominated by the extremes.
    assert(cells.values.forall(_ > 0.8), s"cells=$cells")
    val mid = Seq(32, 64, 128).map(cells).max
    val extremes = math.max(cells(16), cells(512))
    assert(mid >= extremes * 0.85, s"mid=$mid extremes=$extremes")
  }
}
