package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 3: hardware platform row (single-host substitution, DESIGN.md #1). */
class Table3BenchSpec extends AnyFunSuite {

  test("Table 3: hardware platform") {
    val table = MetaTables.table3()
    BenchUtil.report("table3_hardware", table)
    assert(table.contains(System.getProperty("os.arch")))
  }
}
