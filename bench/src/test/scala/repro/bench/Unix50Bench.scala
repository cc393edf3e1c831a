package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** §6.2 — Unix50 pipelines at width 16 (Fig. 11's data). */
class Unix50Bench extends AnyFunSuite {

  test("§6.2 Unix50 simulated speedups at width 16") {
    val (text, speedups) = Tables.unix50Table()
    println(text)
    val byName = speedups.toMap
    val avg = speedups.map(_._2).sum / speedups.size
    // paper: average 6.02×, most pipelines speed up, none slows down badly
    assert(avg > 2.0 && avg < 14.0, s"avg $avg")
    assert(speedups.count(_._2 > 1.5) >= 20, "most pipelines should speed up")
    speedups.foreach { case (n, s) => assert(s > 0.75, s"$n: $s") }
    // paper: #25–30 (awk / sed -n pipelines) see ~no speedup
    val awkish = List(25, 27, 29).map(i => byName(f"unix50-$i%02d"))
    assert(awkish.forall(_ < 2.0), s"awk/sed-n pipelines should stay ~1×: $awkish")
  }
}
