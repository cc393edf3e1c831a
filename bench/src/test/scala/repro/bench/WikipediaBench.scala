package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** §6.4 — Wikipedia web indexing. */
class WikipediaBench extends AnyFunSuite {

  test("§6.4 Wikipedia indexing speedup (width 16)") {
    val (text, s) = Tables.wikipediaTable()
    println(text)
    // paper: 12.7× with most of the win in html-to-text (annotated S stage)
    assert(s > 5.0 && s < 20.0, s"got $s")
  }
}
