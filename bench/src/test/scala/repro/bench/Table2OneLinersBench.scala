package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Tab. 2 — one-liner summary: structure, DFG sizes, compile times. */
class Table2OneLinersBench extends AnyFunSuite {

  test("Table 2: node counts and compile times at widths 16 and 64") {
    val (text, rows) = Tables.table2()
    println(text)
    rows.foreach { r =>
      // DFG grows with width and compilation stays in the millisecond
      // range (paper: 0.056–0.328s at w=16, ≤4.7s at w=64)
      assert(r.nodes64 > r.nodes16, s"${r.name}: ${r.nodes16} vs ${r.nodes64}")
      assert(r.nodes16 >= 16, r.name)
      assert(r.compile64ms < 5000.0, s"${r.name}: ${r.compile64ms}")
    }
    // paper's sort row: 77 / 317 process-level nodes; ours counts the same
    // shape plus the final cat and chunk bookkeeping — within ~15%
    val sortRow = rows.find(_.name == "sort").get
    assert(math.abs(sortRow.nodes16 - 77) <= 12, sortRow.toString)
    assert(math.abs(sortRow.nodes64 - 317) <= 40, sortRow.toString)
  }
}
