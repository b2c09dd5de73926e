package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** §6.5 exact-search shape check: PDX-BOND and PDX-linear lead; DSM trails
  * PDX-linear; the gather kernel trails everything PDX (§7).
  */
class ExactSearchBenchSpec extends AnyFunSuite {

  test("Exact search QPS per layout") {
    val (table, rows) = ExactSearchBench.run(BenchConfig.exactSearchSpecs)
    BenchUtil.report("exact_search_qps", table)

    // Paper headline: PDX-BOND beats the horizontal exact scans clearly
    // (2.5-6.2x in the paper). No scalar-vs-unrolled ordering is asserted:
    // C2 pipelines the plain scalar reduction about as well as the unrolled
    // form (EXPERIMENTS.md).
    val avgSpeedupVsNary = BenchUtil.geomean(rows.map(_.speedupOfBondOver("nary")))
    assert(avgSpeedupVsNary > 1.5, s"PDX-BOND vs nary geomean $avgSpeedupVsNary")

    // High-D is where the PDX layout pays off most (paper Figure 9).
    rows.filter(_.dataset.split("/")(1).toInt >= 128).foreach { r =>
      assert(r.qps("pdx-linear") > r.qps("nary"), s"${r.dataset}: ${r.qps}")
      assert(r.qps("pdx-bond") > r.qps("nary"), s"${r.dataset}: ${r.qps}")
    }
    rows.foreach { r =>
      assert(r.qps("pdx-linear") > r.qps("gather") * 0.9,
             s"${r.dataset}: gather should not beat PDX (q=${r.qps})")
    }
  }

  test("DSM-vs-PDX scan ratio across collection sizes (§7 observation)") {
    val (table, results) = ExactSearchBench.dsmCrossover()
    BenchUtil.report("dsm_crossover", table)
    // Reported, not shape-asserted: the paper's 1.5x PDX-over-DSM advantage
    // hinges on DSM's distances array outgrowing the cache, which this
    // host's large LLC prevents at any feasible N (EXPERIMENTS.md). Sanity
    // band only: neither layout collapses.
    results.foreach { case (n, ratio) =>
      assert(ratio > 0.15 && ratio < 8.0, s"n=$n ratio=$ratio")
    }
  }
}
