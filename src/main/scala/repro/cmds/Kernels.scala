package repro.cmds

import java.util.regex.Pattern
import repro.core.Annotations.Resolved
import repro.core.PClass

/** Pure UNIX command semantics over line streams.
  *
  * One implementation shared by the reference interpreter (`exec.RefExec`)
  * and the Spark executor (`exec.SparkExec` wraps these in `mapPartitions`)
  * — so sequential/parallel equivalence tests compare the *transformation*,
  * not two divergent re-implementations of `sort`.
  *
  * All functions are pure and serializable; nothing here touches Spark.
  * Deliberate, documented simplifications vs GNU byte-for-byte behaviour
  * (e.g. `tr -s` squeezing within a line rather than across the byte
  * stream) apply identically on both executors and to the workloads we
  * generate.
  */
object Kernels extends Serializable {

  /** Execution context: static (configuration) inputs in annotation order,
    * plus the synthetic file/URL store for `xargs`-style inner fetches. */
  final case class Ctx(statics: List[Vector[String]],
                       fetch: String => Vector[String]) extends Serializable

  // ======================================================== tr machinery

  private[cmds] def expandSet(spec: String): String = {
    val out = new StringBuilder
    var i = 0
    val s = spec.replace("\\n", "\n").replace("\\t", "\t").replace("\\\\", "\\")
    while (i < s.length) {
      if (i + 2 < s.length && s.charAt(i + 1) == '-' && s.charAt(i + 2) >= s.charAt(i)) {
        (s.charAt(i) to s.charAt(i + 2)).foreach(out += _)
        i += 3
      } else { out += s.charAt(i); i += 1 }
    }
    out.toString
  }

  private def trLine(r: Resolved): String => Seq[String] = {
    val comp    = r.flags.contains("-c")
    val squeeze = r.flags.contains("-s")
    val delete  = r.flags.contains("-d")
    val set1    = expandSet(r.operands.headOption.getOrElse(""))
    val set2    = r.operands.lift(1).map(expandSet).getOrElse("")
    val in1     = set1.toSet
    line => {
      val sb = new StringBuilder
      var last: Int = -1
      line.foreach { ch =>
        val member = in1.contains(ch) ^ comp
        if (delete) {
          if (!member) sb += ch
        } else if (set2.nonEmpty && member) {
          val mapped =
            if (comp) set2.last
            else {
              val idx = set1.indexOf(ch)
              set2.charAt(math.min(idx, set2.length - 1))
            }
          if (!(squeeze && last == mapped.toInt)) sb += mapped
          last = mapped.toInt
        } else if (squeeze && set2.isEmpty && member) {
          // `tr -s SET`: squeeze repeats of SET members
          if (last != ch.toInt) sb += ch
          last = ch.toInt
        } else { sb += ch; last = -1 }
      }
      val out = sb.toString
      if (out.contains('\n')) out.split("\n", -1).toSeq.filter(_.nonEmpty)
      else Seq(out)
    }
  }

  // ======================================================= cut machinery

  private[cmds] def parseRanges(spec: String): List[(Int, Int)] =
    spec.split(',').toList.map { part =>
      part.split("-", -1) match {
        case Array(a)     => (a.toInt, a.toInt)
        case Array("", b) => (1, b.toInt)
        case Array(a, "") => (a.toInt, Int.MaxValue)
        case Array(a, b)  => (a.toInt, b.toInt)
        case _            => throw new IllegalArgumentException(s"bad range: $spec")
      }
    }

  private def cutLine(r: Resolved): String => Seq[String] = {
    if (r.flagVals.contains("-c")) {
      val ranges = parseRanges(r.flagVals("-c"))
      line => Seq(ranges.map { case (a, b) =>
        val from = math.min(a - 1, line.length)
        val to   = math.min(b, line.length)
        if (from < to) line.substring(from, to) else ""
      }.mkString)
    } else {
      val delim  = r.flagVals.getOrElse("-d", "\t").headOption.getOrElse('\t')
      val ranges = parseRanges(r.flagVals.getOrElse("-f", "1"))
      val onlyDelimited = r.flags.contains("-s")
      line =>
        if (!line.contains(delim)) { if (onlyDelimited) Seq.empty else Seq(line) }
        else {
          val fields = line.split(Pattern.quote(delim.toString), -1)
          val keep = fields.zipWithIndex.collect {
            case (f, i) if ranges.exists { case (a, b) => i + 1 >= a && i + 1 <= b } => f
          }
          Seq(keep.mkString(delim.toString))
        }
    }
  }

  // ======================================================= sed machinery

  /** Parse `s<d>regex<d>replacement<d>[g]`; returns per-line transform. */
  private def sedLine(r: Resolved): String => Seq[String] = {
    val script = r.operands.headOption.getOrElse(
      throw new IllegalArgumentException("sed: missing script"))
    require(script.length > 1 && script.charAt(0) == 's', s"sed: unsupported: $script")
    val d      = script.charAt(1)
    val parts  = splitUnescaped(script.drop(2), d)
    require(parts.size >= 2, s"sed: bad substitution: $script")
    val global = parts.lift(2).exists(_.contains('g'))
    val re     = Pattern.compile(parts(0))
    // sed `&` (whole match) → Java `$0`; escape Java-special chars otherwise
    val repl = {
      val raw = parts(1)
      val sb  = new StringBuilder
      var i   = 0
      while (i < raw.length) {
        raw.charAt(i) match {
          case '\\' if i + 1 < raw.length => sb += raw.charAt(i + 1); i += 2
          case '&'  => sb ++= "$0"; i += 1
          case '$'  => sb ++= "\\$"; i += 1
          case c    => sb += c; i += 1
        }
      }
      sb.toString
    }
    line => {
      val m = re.matcher(line)
      Seq(if (global) m.replaceAll(repl) else m.replaceFirst(repl))
    }
  }

  private def splitUnescaped(s: String, d: Char): List[String] = {
    val out = List.newBuilder[String]
    val sb  = new StringBuilder
    var i   = 0
    while (i < s.length) {
      val c = s.charAt(i)
      if (c == '\\' && i + 1 < s.length && s.charAt(i + 1) == d) { sb += d; i += 2 }
      else if (c == d) { out += sb.toString; sb.clear(); i += 1 }
      else { sb += c; i += 1 }
    }
    out += sb.toString
    out.result()
  }

  // ====================================================== sort machinery

  /** GNU-sort-style comparator from flags: -n, -r, -k F[,M], -t SEP; ties
    * fall back to full-line comparison (last-resort, like GNU without -s). */
  def sortOrdering(r: Resolved): Ordering[String] = {
    val numeric = r.flags.contains("-n")
    val reverse = r.flags.contains("-r")
    val sep     = r.flagVals.get("-t").flatMap(_.headOption)
    val keySpec = r.flagVals.get("-k").map { spec =>
      spec.split(',') match {
        case Array(a)    => (a.takeWhile(_.isDigit).toInt, Int.MaxValue)
        case Array(a, b) => (a.takeWhile(_.isDigit).toInt, b.takeWhile(_.isDigit).toInt)
        case _           => (1, Int.MaxValue)
      }
    }
    def fields(line: String): Array[String] = sep match {
      case Some(c) => line.split(Pattern.quote(c.toString), -1)
      case None    => line.trim.split("\\s+")
    }
    def keyOf(line: String): String = keySpec match {
      case None => line
      case Some((a, b)) =>
        val fs = fields(line)
        fs.slice(a - 1, if (b == Int.MaxValue) fs.length else b).mkString(" ")
    }
    val base: Ordering[String] = new Ordering[String] {
      def compare(x: String, y: String): Int = {
        val (kx, ky) = (keyOf(x), keyOf(y))
        val primary =
          if (numeric) java.lang.Double.compare(numPrefix(kx), numPrefix(ky))
          else kx.compareTo(ky)
        if (primary != 0) primary else x.compareTo(y) // last-resort
      }
    }
    if (reverse) base.reverse else base
  }

  /** Numeric value of a string's leading number (GNU sort -n semantics):
    * optional blanks, optional sign, digits, optional fraction; else 0. */
  private[cmds] def numPrefix(s: String): Double = {
    val m = Pattern.compile("^\\s*(-?[0-9]+(\\.[0-9]*)?)").matcher(s)
    if (m.find()) m.group(1).toDouble else 0.0
  }

  private def sortWhole(r: Resolved): Vector[String] => Vector[String] = {
    val ord    = sortOrdering(r)
    val unique = r.flags.contains("-u")
    v => {
      val sorted = v.sorted(ord)
      if (!unique) sorted
      else sorted.foldLeft(Vector.empty[String]) { (acc, l) =>
        if (acc.nonEmpty && ord.compare(acc.last, l) == 0) acc else acc :+ l
      }
    }
  }

  // ====================================================== misc machinery

  private val UniqCountFmt = "%7d %s"

  private def uniqWhole(r: Resolved): Vector[String] => Vector[String] = {
    val count = r.flags.contains("-c")
    v => {
      val out = Vector.newBuilder[String]
      var cur: Option[String] = None
      var n = 0
      def flush(): Unit = cur.foreach { l =>
        out += (if (count) UniqCountFmt.format(n, l) else l)
      }
      v.foreach { l =>
        if (cur.contains(l)) n += 1
        else { flush(); cur = Some(l); n = 1 }
      }
      flush()
      out.result()
    }
  }

  private def wcWhole(r: Resolved): Vector[String] => Vector[String] = {
    val sel0 = List("-l" -> r.flags.contains("-l"), "-w" -> r.flags.contains("-w"),
                    "-c" -> r.flags.contains("-c")).filter(_._2).map(_._1)
    val sel  = if (sel0.isEmpty) List("-l", "-w", "-c") else sel0
    v => {
      val l = v.size.toLong
      lazy val w = v.iterator.map(_.trim.split("\\s+").count(_.nonEmpty).toLong).sum
      lazy val c = v.iterator.map(_.length.toLong + 1).sum // + newline
      Vector(sel.map { case "-l" => l; case "-w" => w; case "-c" => c }
                .mkString(" "))
    }
  }

  private def headCount(r: Resolved): Int =
    r.flagVals.get("-n").map(_.toInt)
      .orElse(r.flags.collectFirst { case f if f.matches("-[0-9]+") => f.drop(1).toInt })
      .getOrElse(10)

  private def tailSpec(r: Resolved): Either[Int, Int] = {
    // Left(k) = last k lines; Right(k) = from line k (tail -n +k)
    val spec = r.flagVals.get("-n")
      .orElse(r.operands.find(_.matches("\\+[0-9]+")))
      .getOrElse("10")
    if (spec.startsWith("+")) Right(spec.drop(1).toInt) else Left(spec.toInt)
  }

  private def commWhole(r: Resolved): (Vector[String], Vector[String]) => Vector[String] = {
    val show1 = !r.flags.contains("-1")
    val show2 = !r.flags.contains("-2")
    val show3 = !r.flags.contains("-3")
    val ind2  = if (show1) "\t" else ""
    val ind3  = (if (show1) "\t" else "") + (if (show2) "\t" else "")
    (a, b) => {
      val out = Vector.newBuilder[String]
      var (i, j) = (0, 0)
      while (i < a.size || j < b.size) {
        if (j >= b.size || (i < a.size && a(i) < b(j))) {
          if (show1) out += a(i)
          i += 1
        } else if (i >= a.size || b(j) < a(i)) {
          if (show2) out += ind2 + b(j)
          j += 1
        } else {
          if (show3) out += ind3 + a(i)
          i += 1; j += 1
        }
      }
      out.result()
    }
  }

  private def awkWhole(r: Resolved): Vector[String] => Vector[String] = {
    val fs   = r.flagVals.get("-F")
    val prog = r.operands.headOption.getOrElse(
      throw new IllegalArgumentException("awk: missing program")).trim
    def fields(line: String): Array[String] = fs match {
      case Some(s) => line.split(Pattern.quote(s), -1)
      case None    => line.trim.split("\\s+")
    }
    def field(line: String, n: Int): String =
      if (n == 0) line else fields(line).lift(n - 1).getOrElse("")
    val printRe = Pattern.compile("^\\{\\s*print\\s+(.*?)\\s*\\}$")
    val sumRe   = Pattern.compile(
      "^\\{\\s*(\\w+)\\s*\\+=\\s*\\$(\\d+)\\s*\\}\\s*END\\s*\\{\\s*print\\s+\\1\\s*\\}$")
    val pm = printRe.matcher(prog)
    val sm = sumRe.matcher(prog)
    if (sm.matches()) {
      val n = sm.group(2).toInt
      v => Vector(fmtNum(v.iterator.map(l => numPrefix(field(l, n))).sum))
    } else if (pm.matches()) {
      val items = pm.group(1).split(",").map(_.trim).toList
      require(items.forall(_.matches("\\$[0-9]+")), s"awk: unsupported print: $prog")
      val idxs = items.map(_.drop(1).toInt)
      v => v.map(l => idxs.map(field(l, _)).mkString(" "))
    } else throw new IllegalArgumentException(s"awk: unsupported program: $prog")
  }

  private def fmtNum(d: Double): String =
    if (d == d.floor && math.abs(d) < 1e15) d.toLong.toString else d.toString

  private def sha1Whole(v: Vector[String]): Vector[String] = {
    val md = java.security.MessageDigest.getInstance("SHA-1")
    v.foreach { l => md.update(l.getBytes("UTF-8")); md.update('\n'.toByte) }
    Vector(md.digest().map("%02x".format(_)).mkString + "  -")
  }

  /** Trimmed-prefix/suffix structural diff: deterministic, order-preserving
    * (a simplification of Myers diff — documented in DESIGN.md). */
  private def diffWhole(a: Vector[String], b: Vector[String]): Vector[String] = {
    var lo = 0
    while (lo < a.size && lo < b.size && a(lo) == b(lo)) lo += 1
    var hiA = a.size; var hiB = b.size
    while (hiA > lo && hiB > lo && a(hiA - 1) == b(hiB - 1)) { hiA -= 1; hiB -= 1 }
    a.slice(lo, hiA).map("< " + _) ++
      (if (hiA > lo && hiB > lo) Vector("---") else Vector.empty) ++
      b.slice(lo, hiB).map("> " + _)
  }

  private def joinWhole(r: Resolved)(a: Vector[String], b: Vector[String]): Vector[String] = {
    def key(l: String)  = l.trim.split("\\s+").headOption.getOrElse("")
    def rest(l: String) = l.trim.split("\\s+").drop(1).mkString(" ")
    val out = Vector.newBuilder[String]
    var i = 0
    var j = 0
    while (i < a.size && j < b.size) {
      val c = key(a(i)).compareTo(key(b(j)))
      if (c < 0) i += 1
      else if (c > 0) j += 1
      else {
        // cross product of the equal-key runs
        val ke = key(a(i))
        val endI = { var x = i; while (x < a.size && key(a(x)) == ke) x += 1; x }
        val endJ = { var y = j; while (y < b.size && key(b(y)) == ke) y += 1; y }
        for (x <- i until endI; y <- j until endJ)
          out += (ke + " " + rest(a(x)) + " " + rest(b(y))).trim
        i = endI; j = endJ
      }
    }
    out.result()
  }

  private def pasteWhole(r: Resolved)(streams: List[Vector[String]]): Vector[String] = {
    val d = r.flagVals.getOrElse("-d", "\t")
    val n = streams.map(_.size).maxOption.getOrElse(0)
    Vector.tabulate(n) { i =>
      streams.map(_.lift(i).getOrElse("")).mkString(d)
    }
  }

  // =========================================================== dispatch

  /** Per-line kernel for stateless commands; `None` if the command is not
    * per-line (the caller falls back to [[whole]]). */
  def stateless(r: Resolved): Option[Ctx => String => Seq[String]] = r.name match {
    case "cat" | "curl" | "wget" | "gunzip-id" => Some(_ => l => Seq(l))
    case "tr"    => Some(_ => trLine(r))
    case "grep" if !r.flags.contains("-c") && !r.flags.contains("-n") =>
      Some { _ =>
        val flags = (if (r.flags.contains("-i")) Pattern.CASE_INSENSITIVE else 0)
        val p     = Pattern.compile(r.operands.headOption
                      .orElse(r.flagVals.get("-e"))
                      .getOrElse(throw new IllegalArgumentException("grep: no pattern")),
                      flags)
        val invert = r.flags.contains("-v")
        val exact  = r.flags.contains("-x")
        l => {
          val m  = p.matcher(l)
          val ok = if (exact) m.matches() else m.find()
          if (ok ^ invert) Seq(l) else Seq.empty
        }
      }
    case "cut"      => Some(_ => cutLine(r))
    case "sed"      => Some(_ => sedLine(r))
    case "rev"      => Some(_ => l => Seq(l.reverse))
    case "col"      => Some(_ => l => Seq(l.filter(c => c >= ' ' || c == '\t')))
    case "iconv"    => Some(_ => l => Seq(l))
    case "fold"     =>
      val w = r.flagVals.get("-w").map(_.toInt).getOrElse(80)
      Some(_ => l => if (l.isEmpty) Seq("") else l.grouped(w).toSeq)
    case "expand"   => Some(_ => l => Seq(expandTabs(l)))
    case "unexpand" => Some(_ => l => Seq(unexpandSpaces(l)))
    case "gunzip" | "zcat" => Some(_ => l => Seq(l.stripPrefix("GZ:")))
    case "url-extract" =>
      Some { _ =>
        val href = Pattern.compile("href=\"([^\"]+)\"")
        l => { val m = href.matcher(l)
               val out = List.newBuilder[String]
               while (m.find()) out += m.group(1)
               out.result() }
      }
    case "html-to-text" =>
      Some { _ => l =>
        val txt = l.replaceAll("<script[^>]*>.*?</script>", " ")
                   .replaceAll("<[^>]*>", " ")
                   .replaceAll("&[a-z]+;", " ")
                   .replaceAll("\\s+", " ").trim
        if (txt.isEmpty) Seq.empty else Seq(txt)
      }
    case "word-stem" =>
      Some { _ => l =>
        val w = l.toLowerCase
        Seq(List("ingly", "edly", "ing", "ied", "ies", "ed", "ly", "es", "s")
          .collectFirst { case suf if w.endsWith(suf) && w.length > suf.length + 2 =>
            w.dropRight(suf.length) }
          .getOrElse(w))
      }
    case "trim-adapter" =>
      Some { _ => l =>
        val i = l.indexOf("AGATCGGAAGAGC") // Illumina TruSeq adapter motif
        Seq(if (i >= 0) l.take(i) else l)
      }
    case "quality-filter" =>
      Some(_ => l => if (l.count(_ == 'N') * 10 <= l.length.max(1)) Seq(l) else Seq.empty)
    case "comm" if r.flags.contains("-1") && r.flags.contains("-3") =>
      Some { ctx =>
        val dict = ctx.statics.headOption.getOrElse(Vector.empty).toSet
        l => if (dict.contains(l)) Seq.empty else Seq(l)
      }
    case "comm" if r.flags.contains("-2") && r.flags.contains("-3") =>
      Some { ctx =>
        val dict = ctx.statics.headOption.getOrElse(Vector.empty).toSet
        l => if (dict.contains(l)) Seq.empty else Seq(l)
      }
    case "xargs" => Some(ctx => l => xargsBatch(r, ctx, List(l)))
    case "file"  => Some(ctx => l => Seq(fileType(ctx, l)))
    case _       => None
  }

  private def expandTabs(l: String): String = {
    val sb = new StringBuilder
    l.foreach {
      case '\t' => do sb += ' ' while (sb.length % 8 != 0)
      case c    => sb += c
    }
    sb.toString
  }

  private def unexpandSpaces(l: String): String = {
    val lead = l.takeWhile(_ == ' ').length
    "\t" * (lead / 8) + " " * (lead % 8) + l.drop(lead)
  }

  private def fileType(ctx: Ctx, name: String): String = {
    val content = ctx.fetch(name)
    val kind =
      if (content.headOption.exists(_.startsWith("#!")))
        "POSIX shell script, ASCII text executable"
      else "ASCII text"
    s"$name: $kind"
  }

  /** One `xargs` batch: run the inner command with the batch as operands. */
  private def xargsBatch(r: Resolved, ctx: Ctx, batch: List[String]): Seq[String] = {
    val inner = r.operands
    inner match {
      case ("curl" | "wget" | "cat") :: _ =>
        batch.flatMap(ctx.fetch)
      case "wc" :: innerFlags =>
        val countL = innerFlags.contains("-l") || innerFlags.isEmpty
        require(countL, s"xargs wc: unsupported flags $innerFlags")
        val counts = batch.map(f => (ctx.fetch(f).size, f))
        val per    = counts.map { case (n, f) => s"$n $f" }
        if (counts.size > 1) per :+ s"${counts.map(_._1).sum} total" else per
      case "file" :: _ =>
        batch.map(fileType(ctx, _))
      case "grep" :: rest =>
        val pat = Pattern.compile(rest.filterNot(_.startsWith("-")).headOption
          .getOrElse(throw new IllegalArgumentException("xargs grep: no pattern")))
        batch.flatMap(f => ctx.fetch(f).filter(l => pat.matcher(l).find()))
      case other =>
        throw new IllegalArgumentException(s"xargs: unsupported inner command $other")
    }
  }

  /** Whole-stream kernel over the ordered streaming inputs. Defined for
    * every command our evaluation scripts use (any class). */
  def whole(r: Resolved): Ctx => List[Vector[String]] => Vector[String] = r.name match {
    case "sort"  => _ => ss => sortWhole(r)(concat(ss))
    case "uniq"  => _ => ss => uniqWhole(r)(concat(ss))
    case "wc"    => _ => ss => wcWhole(r)(concat(ss))
    case "head"  => _ => ss => concat(ss).take(headCount(r))
    case "tail"  => _ => ss => tailSpec(r) match {
      case Left(k)  => concat(ss).takeRight(k)
      case Right(k) => concat(ss).drop(k - 1)
    }
    case "tac"   => _ => ss => concat(ss).reverse
    case "nl"    => _ => ss => concat(ss).zipWithIndex.map {
      case (l, i) => "%6d\t%s".format(i + 1, l)
    }
    case "cat" if r.flags.contains("-n") => _ => ss => concat(ss).zipWithIndex.map {
      case (l, i) => "%6d\t%s".format(i + 1, l)
    }
    case "grep" if r.flags.contains("-c") =>
      val inner = r.copy(flags = r.flags - "-c")
      ctx => ss => {
        val f = stateless(inner).get(ctx)
        Vector(concat(ss).flatMap(f(_)).size.toString)
      }
    case "comm" if !(r.flags.contains("-1") && r.flags.contains("-3")) &&
                   !(r.flags.contains("-2") && r.flags.contains("-3")) =>
      ctx => ss => {
        val (a, b) = twoStreams(r, ctx, ss)
        commWhole(r)(a, b)
      }
    case "join"  => ctx => ss => { val (a, b) = twoStreams(r, ctx, ss); joinWhole(r)(a, b) }
    case "diff"  => ctx => ss => { val (a, b) = twoStreams(r, ctx, ss); diffWhole(a, b) }
    case "paste" => _ => ss => pasteWhole(r)(ss)
    case "awk"   => _ => ss => awkWhole(r)(concat(ss))
    case "sed" if r.flags.contains("-n") =>
      // address scripts: `sed -n Np` prints only line N
      val prog = r.operands.headOption.getOrElse("")
      val m = Pattern.compile("^([0-9]+)p$").matcher(prog)
      require(m.matches(), s"sed: unsupported -n script: $prog")
      val n = m.group(1).toInt
      _ => ss => concat(ss).slice(n - 1, n)
    case "sha1sum" | "md5sum" | "sha256sum" => _ => ss => sha1Whole(concat(ss))
    case "cksum" => _ => ss => {
      val v = concat(ss)
      Vector(s"${v.hashCode.toLong & 0xffffffffL} ${v.map(_.length + 1).sum}")
    }
    case "xargs" =>
      val n = r.flagVals.get("-n").map(_.toInt)
      ctx => ss => {
        val lines = concat(ss).toList
        val batches = n match {
          case Some(k) => lines.grouped(k).toList
          case None    => if (lines.isEmpty) Nil else List(lines)
        }
        batches.flatMap(xargsBatch(r, ctx, _)).toVector
      }
    case "echo" => _ => _ => Vector(r.operands.mkString(" "))
    case "seq"  => _ => _ => {
      val (from, to) = r.operands.map(_.toLong) match {
        case List(t)    => (1L, t)
        case List(f, t) => (f, t)
        case other      => throw new IllegalArgumentException(s"seq: $other")
      }
      (from to to).map(_.toString).toVector
    }
    case _ =>
      stateless(r) match {
        case Some(mk) => ctx => ss => { val f = mk(ctx); concat(ss).flatMap(f(_)).toVector }
        case None =>
          throw new IllegalArgumentException(
            s"no kernel for command '${r.name}' (args=${r.args})")
      }
  }

  private def concat(ss: List[Vector[String]]): Vector[String] =
    ss.foldLeft(Vector.empty[String])(_ ++ _)

  /** Two-stream commands: statics come first (annotation order). */
  private def twoStreams(r: Resolved, ctx: Ctx,
                         ss: List[Vector[String]]): (Vector[String], Vector[String]) =
    (ctx.statics, ss) match {
      case (Nil, a :: b :: Nil)    => (a, b)
      case (s :: Nil, a :: Nil)    =>
        // which side is static depends on the clause; comm -13's static is
        // operand 0 (the first file), so statics-first is the convention
        (s, a)
      case other =>
        throw new IllegalArgumentException(s"${r.name}: bad stream arity: " +
          s"${ctx.statics.size} static + ${ss.size} streaming")
    }

  // ========================================================= aggregators

  /** Pairwise aggregate functions (§5 "Aggregator Implementations").
    * Each satisfies `agg(f(x), f(y)) == f(x ++ y)` for its command `f`
    * (checked property-style in the test suite). */
  def aggPair(key: String, r: Resolved): (Vector[String], Vector[String]) => Vector[String] =
    key match {
      case "sort-m" =>
        val ord    = sortOrdering(r)
        val unique = r.flags.contains("-u")
        (a, b) => {
          val out = Vector.newBuilder[String]
          var i = 0
          var j = 0
          var last: Option[String] = None
          def push(l: String): Unit =
            if (!unique || !last.exists(ord.compare(_, l) == 0)) { out += l; last = Some(l) }
          while (i < a.size || j < b.size) {
            if (j >= b.size || (i < a.size && ord.compare(a(i), b(j)) <= 0)) {
              push(a(i)); i += 1
            } else { push(b(j)); j += 1 }
          }
          out.result()
        }
      case "uniq" =>
        (a, b) =>
          if (a.nonEmpty && b.nonEmpty && a.last == b.head) a ++ b.tail
          else a ++ b
      case "uniq-c" =>
        (a, b) => {
          if (a.isEmpty) b
          else if (b.isEmpty) a
          else {
            val (ca, la) = parseUniqC(a.last)
            val (cb, lb) = parseUniqC(b.head)
            if (la == lb)
              (a.init :+ UniqCountFmt.format(ca + cb, la)) ++ b.tail
            else a ++ b
          }
        }
      case "wc" =>
        (a, b) => {
          val xs = a.head.trim.split("\\s+").map(_.toLong)
          val ys = b.head.trim.split("\\s+").map(_.toLong)
          Vector(xs.zip(ys).map { case (x, y) => x + y }.mkString(" "))
        }
      case "sum" =>
        (a, b) => Vector((a.head.trim.toLong + b.head.trim.toLong).toString)
      case "head" =>
        (a, b) => (a ++ b).take(headCount(r))
      case "tail" =>
        (a, b) => tailSpec(r) match {
          case Left(k) => (a ++ b).takeRight(k)
          case Right(_) =>
            throw new IllegalArgumentException("tail -n +K has no aggregator")
        }
      case "tac" =>
        (a, b) => b ++ a
      case other =>
        throw new IllegalArgumentException(s"unknown aggregator: $other")
    }

  /** N-ary aggregate over the ordered partial outputs of a parallelized
    * (P) command. Semantically `parts.reduceLeft(aggPair)` (aggregators
    * are associative — tested), but with fast paths so a single aggregator
    * task is one pass over the data instead of a cascade of pairwise
    * merges: `sort -m` exploits Timsort's run detection on concatenated
    * sorted runs; `uniq`/`uniq -c` fix chunk boundaries in a linear scan.
    */
  def aggN(key: String, r: Resolved, parts: List[Vector[String]]): Vector[String] =
    key match {
      case _ if parts.isEmpty     => Vector.empty
      case _ if parts.sizeIs == 1 => parts.head
      case "sort-m" =>
        val ord    = sortOrdering(r)
        val merged = parts.toVector.flatten.sorted(ord)
        if (!r.flags.contains("-u")) merged
        else merged.foldLeft(Vector.empty[String]) { (acc, l) =>
          if (acc.nonEmpty && ord.compare(acc.last, l) == 0) acc else acc :+ l
        }
      case "uniq" =>
        val out = Vector.newBuilder[String]
        var last: Option[String] = None
        parts.foreach { p =>
          val q = if (last.isDefined && p.headOption == last) p.tail else p
          q.foreach(out += _)
          if (p.nonEmpty) last = Some(p.last)
        }
        out.result()
      case "uniq-c" =>
        // adjacent payloads are distinct within each part, so count merges
        // happen exactly at part boundaries — one linear scan suffices
        val out = Vector.newBuilder[String]
        var prev: Option[(Long, String)] = None
        parts.foreach(_.foreach { line =>
          val (c, l) = parseUniqC(line)
          prev match {
            case Some((cp, lp)) if lp == l => prev = Some((cp + c, l))
            case Some((cp, lp)) =>
              out += "%7d %s".format(cp, lp); prev = Some((c, l))
            case None => prev = Some((c, l))
          }
        })
        prev.foreach { case (c, l) => out += "%7d %s".format(c, l) }
        out.result()
      case "tac" => parts.reverse.toVector.flatten
      case _     => parts.reduceLeft(aggPair(key, r))
    }

  /** Parse a `uniq -c` output line into (count, payload). */
  def parseUniqC(line: String): (Long, String) = {
    val t = line.dropWhile(_ == ' ')
    val n = t.takeWhile(_.isDigit)
    (n.toLong, t.drop(n.length + 1))
  }
}
