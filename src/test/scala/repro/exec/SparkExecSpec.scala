package repro.exec

import repro.SparkSpec
import repro.bench.Scripts
import repro.bench.Scripts.ScriptBench
import repro.core.{Frontend, Transform}
import repro.core.Transform.PashConfig

/** Spark executor correctness: for every evaluation script,
  *
  *   SparkExec(parallelized, width) == SparkExec(original) == RefExec(original)
  *
  * i.e. the distributed execution of the transformed DFG reproduces the
  * golden sequential semantics byte-for-byte, including stream order.
  */
class SparkExecSpec extends SparkSpec {

  private def freshStore(b: ScriptBench, scale: Int): Store = {
    val s = new Store(spark.sparkContext); b.setup(s, scale); s
  }

  private def check(b: ScriptBench, widths: List[Int], scale: Int = 2): Unit = {
    val regions = Frontend.compile(b.script).regions
    val golden  = RefExec.runProgram(regions, freshStore(b, scale))
    val sparkSeq = new SparkExec(spark, freshStore(b, scale)).runProgram(regions)
    assert(sparkSeq.stdout == golden.stdout, s"${b.name}: spark sequential stdout differs")
    assert(sparkSeq.files == golden.files, s"${b.name}: spark sequential sinks differ")
    widths.foreach { w =>
      val sparkPar = new SparkExec(spark, freshStore(b, scale))
        .runProgram(regions.map(Transform.parallelize(_, PashConfig(w))))
      assert(sparkPar.stdout == golden.stdout, s"${b.name} width=$w: stdout differs")
      assert(sparkPar.files == golden.files, s"${b.name} width=$w: sinks differ")
    }
  }

  // §6.1 one-liners on Spark, sequential + widths {2, 4}
  Scripts.oneLiners.foreach { b =>
    test(s"spark ${b.name}: parallel == sequential == reference") {
      check(b, List(2, 4))
    }
  }

  // a representative Unix50 slice on Spark (full set runs on RefExec)
  List(0, 4, 6, 9, 14, 18, 24, 26, 30).foreach { i =>
    val b = Scripts.unix50(i)
    test(s"spark ${b.name}: parallel == sequential == reference") {
      check(b, List(3))
    }
  }

  test("spark noaa: parallel == sequential == reference") {
    check(Scripts.noaa, List(2, 4), scale = 8)
  }
  test("spark wikipedia: parallel == sequential == reference") {
    check(Scripts.wikipedia, List(2, 4), scale = 6)
  }
  test("spark bio: parallel == sequential == reference") {
    check(Scripts.bio, List(2, 4))
  }

  test("spark naive chunk-and-concat corrupts wf (§6.5 GNU-parallel misuse)") {
    val b = Scripts.wf
    val regions = Frontend.compile(b.script).regions
    val golden = RefExec.runProgram(regions, freshStore(b, 2))
    val naive  = new SparkExec(spark, freshStore(b, 2))
      .runProgram(regions.map(Transform.naiveParallel(_, PashConfig(4))))
    assert(naive.stdout != golden.stdout)
    val diff = naive.stdout.zipAll(golden.stdout, "∅", "∅").count { case (a, c) => a != c }
    assert(diff.toDouble / golden.stdout.size.max(1) > 0.5,
      s"expected large corruption, got $diff/${golden.stdout.size}")
  }

  test("chunked file reads preserve order (rddPart concatenation)") {
    val s = new Store(spark.sparkContext)
    s.add("f", 1000, i => s"line-$i")
    val whole = s.rdd("f", 1).collect().toVector
    val parts = (0 until 7).flatMap(i => s.rddPart("f", i, 7).collect()).toVector
    assert(parts == whole)
  }
}
