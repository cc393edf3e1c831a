package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{AnnotationLib, PClass}

/** Tab. 1 — the POSIX/GNU parallelizability study. */
class Table1StudyBench extends AnyFunSuite {

  test("Table 1: parallelizability classes") {
    val text = Tables.table1()
    println(text)
    val s = AnnotationLib.study
    assert(s(PClass.Stateless) == ((22, 28)))
    assert(s(PClass.Pure) == ((8, 9)))
    assert(s(PClass.NonParallel) == ((13, 13)))
    assert(s(PClass.SideEffectful) == ((57, 105)))
  }
}
