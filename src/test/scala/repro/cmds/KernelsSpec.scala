package repro.cmds

import org.scalatest.funsuite.AnyFunSuite
import repro.core.AnnotationLib
import repro.cmds.Kernels.Ctx

/** Unit semantics of every command kernel (hand-computed expectations). */
class KernelsSpec extends AnyFunSuite {

  private val ctx = Ctx(Nil, _ => Vector.empty)

  private def run(name: String, args: List[String], in: Vector[String],
                  statics: List[Vector[String]] = Nil,
                  fetch: String => Vector[String] = _ => Vector.empty): Vector[String] = {
    val r = AnnotationLib.resolve(name, args)
    Kernels.whole(r)(Ctx(statics, fetch))(List(in))
  }

  // ------------------------------------------------------------------ tr

  test("tr range translation") {
    assert(run("tr", List("A-Z", "a-z"), Vector("HeLLo", "X")) == Vector("hello", "x"))
  }
  test("tr -s squeezes repeats of the set") {
    assert(run("tr", List("-s", " "), Vector("a   b  c")) == Vector("a b c"))
  }
  test("tr -d deletes set members") {
    assert(run("tr", List("-d", "aeiou"), Vector("education")) == Vector("dctn"))
  }
  test("tr -cs complement-translate splits words onto lines") {
    assert(run("tr", List("-cs", "A-Za-z", "\\n"), Vector("foo, bar!! baz")) ==
      Vector("foo", "bar", "baz"))
  }
  test("tr set expansion handles multiple ranges") {
    assert(Kernels.expandSet("a-cx0-2") == "abcx012")
  }

  // ---------------------------------------------------------------- grep

  test("grep keeps matching lines") {
    assert(run("grep", List("gz"), Vector("a.gz", "b.txt", "c.gz.d")) ==
      Vector("a.gz", "c.gz.d"))
  }
  test("grep -v inverts") {
    assert(run("grep", List("-v", "x"), Vector("ax", "b")) == Vector("b"))
  }
  test("grep -i ignores case") {
    assert(run("grep", List("-i", "foo"), Vector("FOO", "bar")) == Vector("FOO"))
  }
  test("grep -iv combined") {
    assert(run("grep", List("-iv", "999"), Vector("0999", "123")) == Vector("123"))
  }
  test("grep -x exact line match") {
    assert(run("grep", List("-x", "the"), Vector("the", "then")) == Vector("the"))
  }
  test("grep -c counts matches") {
    assert(run("grep", List("-c", "a"), Vector("ab", "b", "za")) == Vector("2"))
  }
  test("grep -E regex alternation") {
    assert(run("grep", List("-E", "(th|t|h)+e"), Vector("the end", "zzz")) ==
      Vector("the end"))
  }

  // ----------------------------------------------------------------- cut

  test("cut -c character range") {
    assert(run("cut", List("-c", "89-92"),
      Vector("x" * 88 + " 123trail")) == Vector(" 123"))
  }
  test("cut -c open range") {
    assert(run("cut", List("-c", "3-"), Vector("abcdef")) == Vector("cdef"))
  }
  test("cut -d -f field selection") {
    assert(run("cut", List("-d", " ", "-f", "9"),
      Vector("a b c d e f g h iii j")) == Vector("iii"))
  }
  test("cut -d: -f1 glued") {
    assert(run("cut", List("-d:", "-f1"), Vector("name: rest")) == Vector("name"))
  }
  test("cut lines without delimiter pass through") {
    assert(run("cut", List("-d", ":", "-f", "2"), Vector("nodelim")) == Vector("nodelim"))
  }
  test("cut field list with commas") {
    assert(run("cut", List("-d", ",", "-f", "1,3"), Vector("a,b,c,d")) == Vector("a,c"))
  }

  // ----------------------------------------------------------------- sed

  test("sed substitution first occurrence") {
    assert(run("sed", List("s/a/X/"), Vector("banana")) == Vector("bXnana"))
  }
  test("sed global substitution") {
    assert(run("sed", List("s/a/X/g"), Vector("banana")) == Vector("bXnXnX"))
  }
  test("sed anchors and alternate delimiter") {
    assert(run("sed", List("s;^;pre/;"), Vector("x")) == Vector("pre/x"))
  }
  test("sed & references the whole match") {
    assert(run("sed", List("s/an/[&]/"), Vector("banana")) == Vector("b[an]ana"))
  }
  test("sed -n Np prints only line N") {
    assert(run("sed", List("-n", "2p"), Vector("a", "b", "c")) == Vector("b"))
  }

  // ---------------------------------------------------------------- sort

  test("sort lexicographic") {
    assert(run("sort", Nil, Vector("b", "a", "c")) == Vector("a", "b", "c"))
  }
  test("sort -n numeric") {
    assert(run("sort", List("-n"), Vector("10", "9", "  2")) == Vector("  2", "9", "10"))
  }
  test("sort -rn reverse numeric") {
    assert(run("sort", List("-rn"), Vector("1", "100", "42")) == Vector("100", "42", "1"))
  }
  test("sort -u dedups") {
    assert(run("sort", List("-u"), Vector("b", "a", "b")) == Vector("a", "b"))
  }
  test("sort -k 2 sorts on the second field") {
    assert(run("sort", List("-k", "2"), Vector("x b", "y a")) == Vector("y a", "x b"))
  }
  test("sort -n ties fall back to whole line") {
    assert(run("sort", List("-n"), Vector("7 b", "7 a")) == Vector("7 a", "7 b"))
  }

  // --------------------------------------------------------- uniq and wc

  test("uniq collapses adjacent duplicates only") {
    assert(run("uniq", Nil, Vector("a", "a", "b", "a")) == Vector("a", "b", "a"))
  }
  test("uniq -c counts") {
    assert(run("uniq", List("-c"), Vector("a", "a", "b")) ==
      Vector("      2 a", "      1 b"))
  }
  test("wc -l counts lines") {
    assert(run("wc", List("-l"), Vector("a", "b", "c")) == Vector("3"))
  }
  test("wc -lw counts lines and words") {
    assert(run("wc", List("-lw"), Vector("a b", "c")) == Vector("2 3"))
  }
  test("wc default prints l w c") {
    assert(run("wc", Nil, Vector("ab cd")) == Vector("1 2 6"))
  }

  // ------------------------------------------------- head/tail/tac/nl/cat

  test("head -n") {
    assert(run("head", List("-n", "2"), Vector("a", "b", "c")) == Vector("a", "b"))
  }
  test("head default is 10") {
    assert(run("head", Nil, (1 to 20).map(_.toString).toVector).size == 10)
  }
  test("tail -n") {
    assert(run("tail", List("-n", "2"), Vector("a", "b", "c")) == Vector("b", "c"))
  }
  test("tail -n +2 drops the first line") {
    assert(run("tail", List("-n", "+2"), Vector("a", "b", "c")) == Vector("b", "c"))
  }
  test("tac reverses") {
    assert(run("tac", Nil, Vector("a", "b")) == Vector("b", "a"))
  }
  test("nl numbers lines") {
    assert(run("nl", Nil, Vector("x")) == Vector("     1\tx"))
  }
  test("cat -n numbers lines") {
    assert(run("cat", List("-n"), Vector("x", "y")) ==
      Vector("     1\tx", "     2\ty"))
  }

  // ---------------------------------------------------------------- comm

  test("comm -13: lines unique to the second input") {
    val r = AnnotationLib.resolve("comm", List("-13", "dict", "-"))
    val out = Kernels.whole(r)(Ctx(List(Vector("apple", "pear")), _ => Vector.empty))(
      List(Vector("apple", "zebra")))
    assert(out == Vector("zebra"))
  }
  test("comm full merge with tabs") {
    val r = AnnotationLib.resolve("comm", List("a", "b"))
    val out = Kernels.whole(r)(Ctx(Nil, _ => Vector.empty))(
      List(Vector("a", "b"), Vector("b", "c")))
    assert(out == Vector("a", "\t\tb", "\tc"))
  }

  // ----------------------------------------------------- awk/join/paste

  test("awk print field") {
    assert(run("awk", List("{print $2}"), Vector("a b c")) == Vector("b"))
  }
  test("awk print two fields") {
    assert(run("awk", List("{print $2, $1}"), Vector("a b")) == Vector("b a"))
  }
  test("awk sum") {
    assert(run("awk", List("{s+=$1} END {print s}"), Vector("1", "2", "4")) ==
      Vector("7"))
  }
  test("awk -F custom separator") {
    assert(run("awk", List("-F", ",", "{print $2}"), Vector("a,b,c")) == Vector("b"))
  }
  test("join on first field") {
    val r = AnnotationLib.resolve("join", List("a", "b"))
    val out = Kernels.whole(r)(ctx)(List(Vector("k1 x", "k2 y"), Vector("k2 z")))
    assert(out == Vector("k2 y z"))
  }
  test("paste zips with tab") {
    val r = AnnotationLib.resolve("paste", List("a", "b"))
    val out = Kernels.whole(r)(ctx)(List(Vector("1", "2"), Vector("x", "y")))
    assert(out == Vector("1\tx", "2\ty"))
  }

  // ------------------------------------------------------ xargs and misc

  test("xargs -n 1 curl fetches per line") {
    val fetch = (u: String) => Vector(s"<$u>")
    assert(run("xargs", List("-n", "1", "curl", "-s"), Vector("u1", "u2"),
      fetch = fetch) == Vector("<u1>", "<u2>"))
  }
  test("xargs -n 1 wc -l counts per file") {
    val fetch = (f: String) => Vector.fill(if (f == "a") 3 else 5)("l")
    assert(run("xargs", List("-n", "1", "wc", "-l"), Vector("a", "b"),
      fetch = fetch) == Vector("3 a", "5 b"))
  }
  test("xargs file reports script type") {
    val fetch = (f: String) => if (f == "s.sh") Vector("#!/bin/sh", "x")
                               else Vector("data")
    assert(run("xargs", List("file"), Vector("s.sh", "d.txt"), fetch = fetch) ==
      Vector("s.sh: POSIX shell script, ASCII text executable",
             "d.txt: ASCII text"))
  }
  test("gunzip strips the synthetic member marker") {
    assert(run("gunzip", Nil, Vector("GZ:payload")) == Vector("payload"))
  }
  test("rev reverses characters") {
    assert(run("rev", Nil, Vector("abc")) == Vector("cba"))
  }
  test("fold wraps long lines") {
    assert(run("fold", List("-w", "2"), Vector("abcde")) == Vector("ab", "cd", "e"))
  }
  test("sha1sum is deterministic, one line") {
    val a = run("sha1sum", Nil, Vector("x", "y"))
    val b = run("sha1sum", Nil, Vector("x", "y"))
    assert(a == b && a.size == 1 && a.head.endsWith("  -"))
  }
  test("diff of equal inputs is empty") {
    val r = AnnotationLib.resolve("diff", List("a", "b"))
    assert(Kernels.whole(r)(ctx)(List(Vector("x"), Vector("x"))).isEmpty)
  }
  test("diff marks sides") {
    val r = AnnotationLib.resolve("diff", List("a", "b"))
    val out = Kernels.whole(r)(ctx)(List(Vector("x", "q"), Vector("x", "z")))
    assert(out == Vector("< q", "---", "> z"))
  }
  test("html-to-text strips tags") {
    assert(run("html-to-text", Nil,
      Vector("<p>hello <b>world</b></p>", "<script>x</script>")) == Vector("hello world"))
  }
  test("url-extract pulls hrefs") {
    assert(run("url-extract", Nil,
      Vector("""<a href="http://x">a</a> <a href="http://y">b</a>""")) ==
      Vector("http://x", "http://y"))
  }
  test("word-stem strips suffixes") {
    assert(run("word-stem", Nil, Vector("Running", "boxes", "cat")) ==
      Vector("runn", "box", "cat"))
  }
  test("trim-adapter cuts at the adapter motif") {
    assert(run("trim-adapter", Nil, Vector("ACGTAGATCGGAAGAGCTTT")) == Vector("ACGT"))
  }

  // ------------------------------------------------------------ misc fns

  test("numPrefix parses leading numbers") {
    assert(Kernels.numPrefix("  42 rest") == 42.0)
    assert(Kernels.numPrefix("-3.5x") == -3.5)
    assert(Kernels.numPrefix("abc") == 0.0)
  }
  test("parseUniqC round-trips the format") {
    assert(Kernels.parseUniqC("      7 the line") == ((7L, "the line")))
  }
  test("parseRanges handles all forms") {
    assert(Kernels.parseRanges("1,3-5,-2,7-") ==
      List((1, 1), (3, 5), (1, 2), (7, Int.MaxValue)))
  }
}
