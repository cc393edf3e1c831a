package repro.bench

import repro.SparkSpec

/** §6.1 — one-liner speedups: the simulated width sweep + runtime lattice
  * (Fig. 10's data) and real Spark wall-clock speedups at container scale.
  */
class OneLinerSpeedupsBench extends SparkSpec {

  test("§6.1 simulated width sweep and runtime lattice") {
    val (text, results) = Tables.table61()
    println(text)

    def avg(config: String, w: Int): Double = {
      val xs = Scripts.oneLiners.map(b => results((b.name, config, w)))
      xs.sum / xs.size
    }
    // paper's qualitative claims:
    // (1) speedup grows with width for the full configuration
    val pashAvgs = List(2, 4, 8, 16, 32, 64).map(avg("PaSh", _))
    assert(pashAvgs.zip(pashAvgs.tail).forall { case (a, b) => b >= a * 0.95 },
           s"not monotone: $pashAvgs")
    // (2) the full config beats the transforms-only config on average
    assert(avg("PaSh", 16) > avg("No Eager", 16))
    // (3) nontrivial average speedup at width 16 (paper: 8.83; no-eager 5.93)
    assert(avg("PaSh", 16) > 3.0, s"got ${avg("PaSh", 16)}")
    // (4) nothing is catastrophically slowed down
    Scripts.oneLiners.foreach { b =>
      assert(results((b.name, "PaSh", 16)) > 0.8, b.name)
    }
  }

  test("§6.1 real Spark wall-clock speedups (subset)") {
    val subset = List(Scripts.nfaRegex, Scripts.wf, Scripts.sortOne, Scripts.spell)
    val widths = List(4, 16)
    val (text, results) = Tables.sparkSpeedups(spark, subset, widths, scale = 400)
    println(text)
    // on 16 cores: parallel must not lose to sequential anywhere, and must
    // clearly win in aggregate (per-script ratios jitter at MB scale, so
    // the per-script bound is directional and the aggregate bound firm)
    val bests = subset.map { b => widths.map(w => results((b.name, w))).max }
    subset.zip(bests).foreach { case (b, best) =>
      assert(best > 1.0, s"${b.name}: best speedup $best")
    }
    val geomean = math.pow(bests.product, 1.0 / bests.size)
    assert(geomean > 1.8, s"geometric-mean best speedup $geomean")
  }
}
