package repro.cmds

import org.scalatest.funsuite.AnyFunSuite
import repro.core.AnnotationLib
import repro.cmds.Kernels.Ctx
import repro.bench.SynthText

/** The paper's two algebraic laws (§4.3), checked per command over random
  * line streams:
  *
  *  - stateless:  f(x ++ y) == f(x) ++ f(y)          (semigroup homomorphism)
  *  - pure:       agg(m(x), m(y)) == f(x ++ y)       (map/aggregate pair)
  *
  * These are exactly the side conditions that make the parallelization
  * transform behaviour-preserving, so every annotated command must pass.
  * (Deterministic seeded property driver — scalatest+scalacheck bridge is
  * not in the offline cache.)
  */
class LawsSpec extends AnyFunSuite {

  private val ctx = Ctx(Nil, _ => Vector.empty)

  private val vocab = Vector("the", "Fox", "jumps", "42", "a-b", "x,y",
                             "999", "GZ:zip", "  pad", "word", "", "AGATCGGAAGAGCx")

  private def randLine(seed: Long, i: Long): String = {
    val n = (SynthText.mix(seed, i) & 7).toInt
    (0 until n).map(k => vocab((SynthText.mix(seed, i * 16 + k) % vocab.size).toInt.abs))
      .mkString(" ")
  }

  private def randStream(seed: Long): Vector[String] = {
    val n = (SynthText.mix(seed, 0) & 31).toInt
    Vector.tabulate(n)(i => randLine(seed, i + 1))
  }

  /** 60 random (x, y) stream pairs, including empty/one-sided cases. */
  private def forAllPairs(f: (Vector[String], Vector[String]) => Unit): Unit = {
    f(Vector.empty, Vector.empty)
    f(Vector.empty, Vector("x"))
    f(Vector("x"), Vector.empty)
    (1 to 60).foreach { s =>
      f(randStream(s * 2L), randStream(s * 2L + 1))
    }
  }

  private def checkStateless(name: String, args: List[String]): Unit =
    test(s"stateless law: $name ${args.mkString(" ")}") {
      val r = AnnotationLib.resolve(name, args)
      assert(r.cls == repro.core.PClass.Stateless, s"$name must be (S)")
      val f = Kernels.whole(r)(ctx)
      forAllPairs { (x, y) =>
        assert(f(List(x ++ y)) == f(List(x)) ++ f(List(y)))
      }
    }

  private def checkPure(name: String, args: List[String]): Unit =
    test(s"map/aggregate law: $name ${args.mkString(" ")}") {
      val r = AnnotationLib.resolve(name, args)
      assert(r.cls == repro.core.PClass.Pure && r.agg.isDefined, s"$name must be (P)+agg")
      val f   = Kernels.whole(r)(ctx)
      val agg = Kernels.aggPair(r.agg.get, r)
      forAllPairs { (x, y) =>
        assert(agg(f(List(x)), f(List(y))) == f(List(x ++ y)))
      }
    }

  // ---- stateless commands (f(x·y) = f(x)·f(y))
  checkStateless("cat", Nil)
  checkStateless("tr", List("A-Z", "a-z"))
  checkStateless("tr", List("-d", "aeiou"))
  checkStateless("tr", List("-cs", "A-Za-z", "\\n"))
  checkStateless("grep", List("the"))
  checkStateless("grep", List("-v", "42"))
  checkStateless("grep", List("-iv", "999"))
  checkStateless("grep", List("-x", "the"))
  checkStateless("cut", List("-d", " ", "-f", "2"))
  checkStateless("cut", List("-c", "1-5"))
  checkStateless("sed", List("s/the/THE/"))
  checkStateless("sed", List("s/a/b/g"))
  checkStateless("rev", Nil)
  checkStateless("fold", List("-w", "3"))
  checkStateless("gunzip", Nil)
  checkStateless("word-stem", Nil)
  checkStateless("html-to-text", Nil)
  checkStateless("trim-adapter", Nil)
  checkStateless("quality-filter", Nil)
  checkStateless("expand", Nil)
  checkStateless("col", Nil)

  test("stateless law: comm -13 with static dictionary") {
    val r    = AnnotationLib.resolve("comm", List("-13", "dict", "-"))
    val dict = Vector("42", "the", "word")
    val c    = Ctx(List(dict), _ => Vector.empty)
    val f    = Kernels.whole(r)(c)
    forAllPairs { (x, y) =>
      assert(f(List(x ++ y)) == f(List(x)) ++ f(List(y)))
    }
  }

  // ---- parallelizable pure commands (agg ∘ map = f)
  checkPure("sort", Nil)
  checkPure("sort", List("-n"))
  checkPure("sort", List("-rn"))
  checkPure("sort", List("-u"))
  checkPure("sort", List("-k", "2"))
  checkPure("sort", List("-rn", "-k", "2"))
  checkPure("wc", List("-l"))
  checkPure("wc", List("-lw"))
  checkPure("wc", Nil)
  checkPure("head", List("-n", "5"))
  checkPure("head", List("-n", "1"))
  checkPure("tail", List("-n", "5"))
  checkPure("tac", Nil)
  checkPure("grep", List("-c", "the"))

  // uniq's law holds on sorted inputs (its pipeline position): split x·y
  test("map/aggregate law: uniq (sorted streams, all split points)") {
    val r   = AnnotationLib.resolve("uniq", Nil)
    val f   = Kernels.whole(r)(ctx)
    val agg = Kernels.aggPair("uniq", r)
    (1 to 25).foreach { seed =>
      val s = randStream(seed.toLong).sorted
      (0 to s.size).foreach { cut =>
        val (x, y) = s.splitAt(cut)
        assert(agg(f(List(x)), f(List(y))) == f(List(s)))
      }
    }
  }

  test("map/aggregate law: uniq -c (sorted streams, all split points)") {
    val r   = AnnotationLib.resolve("uniq", List("-c"))
    val f   = Kernels.whole(r)(ctx)
    val agg = Kernels.aggPair("uniq-c", r)
    (1 to 25).foreach { seed =>
      val s = randStream(seed.toLong).sorted
      (0 to s.size).foreach { cut =>
        val (x, y) = s.splitAt(cut)
        assert(agg(f(List(x)), f(List(y))) == f(List(s)))
      }
    }
  }

  test("aggregators are associative (sort-m over three chunks)") {
    val r   = AnnotationLib.resolve("sort", List("-n"))
    val f   = Kernels.whole(r)(ctx)
    val agg = Kernels.aggPair("sort-m", r)
    (1 to 30).foreach { s =>
      val (x, y, z) = (randStream(s * 3L), randStream(s * 3L + 1), randStream(s * 3L + 2))
      val l  = agg(agg(f(List(x)), f(List(y))), f(List(z)))
      val rr = agg(f(List(x)), agg(f(List(y)), f(List(z))))
      assert(l == rr && l == f(List(x ++ y ++ z)))
    }
  }
}
