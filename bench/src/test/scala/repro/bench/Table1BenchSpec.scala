package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 1: synthetic dataset catalog summary (stand-in for the paper's 10
  * real collections — DESIGN.md, substitution #2).
  */
class Table1BenchSpec extends AnyFunSuite {

  test("Table 1: dataset catalog summary") {
    val table = MetaTables.table1(BenchConfig.catalog)
    BenchUtil.report("table1_datasets", table)
    assert(table.contains("OpenAI") && table.contains("1536"))
  }

  test("skewed datasets measure more marginal skewness than normal ones") {
    val specs = BenchConfig.catalog
    val skews = specs.map { s =>
      s.skewed -> repro.data.VectorData.meanAbsSkewness(DatasetCache.dataset(s).vectors)
    }
    val (sk, nm) = skews.partition(_._1)
    val avgSk = sk.map(_._2).sum / sk.length
    val avgNm = nm.map(_._2).sum / nm.length
    assert(avgSk > avgNm, s"skewed=$avgSk normal=$avgNm")
  }
}
