package repro.bench

import repro.SparkSpec

/** §6.5 — micro-benchmarks: parallel sort and GNU-parallel comparison. */
class MicroBench extends SparkSpec {

  test("§6.5 PaSh sort vs sort --parallel") {
    val (text, results) = Tables.microSort()
    println(text)
    val (sp64, spNe64, sg64) = results(64)
    // paper: S_p without eager ≈ S_g; S_p with eager ≈ 2× S_g
    assert(sp64 > sg64 * 1.3, s"PaSh $sp64 should beat --parallel $sg64")
    assert(math.abs(spNe64 - sg64) / sg64 < 1.0,
           s"no-eager $spNe64 should be comparable to --parallel $sg64")
    // --parallel's own scaling flattens (inherently limited)
    val (_, _, sg2) = results(2)
    assert(sg64 < sg2 * 4, s"sort --parallel should flatten: $sg2 → $sg64")
  }

  test("§6.5 GNU parallel on the bio script: timings") {
    val (text, (pashS, bottleneckS)) = Tables.microGnuParallel()
    println(text)
    // paper: PaSh 4.3× vs bottleneck-only 1.8×
    assert(pashS > bottleneckS, s"PaSh $pashS vs bottleneck $bottleneckS")
    assert(pashS > 2.0, s"PaSh speedup $pashS")
    assert(bottleneckS < pashS && bottleneckS > 1.2, s"bottleneck $bottleneckS")
  }

  test("§6.5 GNU parallel misuse: measured output corruption (Spark)") {
    val (text, frac) = Tables.microGnuParallelDiff(spark)
    println(text)
    // paper: 92% of output differs under careless parallelization
    assert(frac > 0.5, s"expected large corruption, got $frac")
  }
}
