package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** §6.3 — NOAA weather analysis: total / preprocessing / compute. */
class NoaaBench extends AnyFunSuite {

  test("§6.3 NOAA speedups (width 16)") {
    val (text, (total, pre, comp)) = Tables.noaaTable()
    println(text)
    // paper: total 2.52×, preprocessing 2.04× (network-bound),
    // compute 12.31× (CPU-bound)
    assert(total > 1.2 && total < 6.0, s"total $total")
    assert(pre > 1.2 && pre < 5.0, s"pre $pre")
    assert(comp > 4.0, s"compute $comp")
    assert(comp > pre * 2, "compute must dominate preprocessing speedup")
  }
}
