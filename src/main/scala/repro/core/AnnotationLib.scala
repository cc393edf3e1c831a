package repro.core

import Annotations._
import PClass._

/** PaSh's standard library of annotations (§3.2) plus the POSIX/GNU
  * parallelizability study (§3.1, Tab. 1).
  *
  * Detailed records (flags → class/inputs/outputs/aggregator) exist for
  * every command used by the evaluation scripts; the remaining commands of
  * GNU Coreutils and POSIX carry a bare class assignment used both for the
  * Tab. 1 study and as a conservative default during translation.
  */
object AnnotationLib {

  // ----------------------------------------------------- detailed records

  private def filterIn  = List(In(AllOperandsOrStdin))
  private def out       = List(StdoutRef: IoRef)

  private def simple(name: String, cls: PClass, agg: Option[String] = None,
                     valueFlags: Set[String] = Set.empty,
                     combined: Boolean = false): Annotation =
    Annotation(name, List(Clause(Always, cls, filterIn, out, agg)), valueFlags,
               shortCombined = combined)

  /** Detailed annotation records, keyed by command name. 47+ commands. */
  val records: Map[String, Annotation] = List(
    // --- stateless workhorses -------------------------------------------
    Annotation("cat", List(
      Clause(Flag("-n"), Pure, filterIn, out, None), // line numbering: stateful
      Clause(Always, Stateless, filterIn, out),
    )),
    // tr's operands are character sets, never files: stdin only
    Annotation("tr", List(Clause(Always, Stateless, List(In(StdinRef)), out)),
               shortCombined = true),
    Annotation("grep", List(
      // operand 0 is the pattern; files (if any) start at operand 1
      Clause(Flag("-c"), Pure, List(In(OperandsFrom(1))), out, Some("sum")),
      Clause(Flag("-n"), Pure, List(In(OperandsFrom(1))), out, None),
      Clause(Always, Stateless, List(In(OperandsFrom(1))), out),
    ), valueFlags = Set("-e", "-f"), shortCombined = true),
    simple("cut", Stateless, valueFlags = Set("-d", "-f", "-c")),
    Annotation("sed", List(
      // operand 0 is the script; substitution-only scripts are per-line maps
      Clause(!Flag("-n") && ArgMatch("^s[/;,|#].*"), Stateless,
             List(In(OperandsFrom(1))), out),
      Clause(Always, NonParallel, List(In(OperandsFrom(1))), out),
    ), valueFlags = Set("-e")),
    simple("rev", Stateless),
    simple("col", Stateless),
    simple("iconv", Stateless, valueFlags = Set("-f", "-t")),
    simple("basename", Stateless),
    simple("dirname", Stateless),
    simple("fold", Stateless, valueFlags = Set("-w")),
    simple("expand", Stateless),
    simple("unexpand", Stateless),
    // gzip as a per-member stream codec; our synthetic substrate is per-line
    simple("gunzip", Stateless),
    simple("zcat", Stateless),
    // annotated third-party commands (§6.4 / §6.5): trivially described as S
    simple("url-extract", Stateless),
    simple("html-to-text", Stateless),
    simple("word-stem", Stateless),
    simple("trim-adapter", Stateless),  // cutadapt-like (§6.5)
    simple("quality-filter", Stateless),

    // --- parallelizable pure --------------------------------------------
    Annotation("sort", List(
      Clause(Flag("-m"), Pure, filterIn, out, None), // already an aggregator
      Clause(Always, Pure, filterIn, out, Some("sort-m")),
    ), valueFlags = Set("-k", "-t", "-S"), shortCombined = true),
    Annotation("uniq", List(
      Clause(Flag("-c"), Pure, filterIn, out, Some("uniq-c")),
      Clause(Always, Pure, filterIn, out, Some("uniq")),
    ), shortCombined = true),
    Annotation("wc", List(
      Clause(Always, Pure, filterIn, out, Some("wc")),
    ), shortCombined = true),
    Annotation("head", List(
      Clause(Always, Pure, filterIn, out, Some("head")),
    ), valueFlags = Set("-n", "-c")),
    Annotation("tail", List(
      // `tail -n +K` (drop a prefix) has no per-chunk map that composes
      // with a pure aggregate — stays sequential (conservative)
      Clause(ArgMatch("^\\+[0-9]+$"), Pure, filterIn, out, None),
      Clause(Always, Pure, filterIn, out, Some("tail")),
    ), valueFlags = Set("-n", "-c")),
    Annotation("tac", List(
      Clause(Always, Pure, filterIn, out, Some("tac")),
    )),
    Annotation("nl", List(
      Clause(Always, Pure, filterIn, out, None),
    )),
    Annotation("comm", List(
      Clause(Flag("-1") && Flag("-3"), Stateless,
             List(In(OperandRef(0), static = true), In(OperandRef(1))), out),
      Clause(Flag("-2") && Flag("-3"), Stateless,
             List(In(OperandRef(1), static = true), In(OperandRef(0))), out),
      Clause(Always, Pure,
             List(In(OperandRef(0)), In(OperandRef(1))), out, None),
    ), stdinHyphen = true, shortCombined = true),
    Annotation("join", List(
      Clause(Always, Pure, List(In(OperandRef(0)), In(OperandRef(1))), out, None),
    ), stdinHyphen = true, valueFlags = Set("-1", "-2", "-t", "-j")),
    Annotation("paste", List(
      // single-input `paste -s`-free invocations are per-line; multi-input
      // or serial mode interleaves streams — keep sequential.
      Clause(Always, Pure, filterIn, out, None),
    ), stdinHyphen = true, valueFlags = Set("-d")),

    // --- non-parallelizable pure ----------------------------------------
    simple("sha1sum", NonParallel),
    simple("md5sum", NonParallel),
    simple("sha256sum", NonParallel),
    simple("cksum", NonParallel),
    Annotation("awk", List(
      // operand 0 is the program; files start at operand 1
      Clause(Always, NonParallel, List(In(OperandsFrom(1))), out),
    ), valueFlags = Set("-F", "-v", "-f")),
    simple("bc", NonParallel),
    simple("diff", NonParallel),
    simple("cmp", NonParallel),
    simple("od", NonParallel),
    simple("pr", NonParallel),
    simple("tsort", NonParallel),
    simple("shuf", NonParallel),
    // network fetch: read-only effect; a pure-ish source PaSh can keep
    // inside a DFG but never replicates (cf. Fig. 3: curl's output is split)
    simple("curl", NonParallel, valueFlags = Set("-o", "-H")),
    simple("wget", NonParallel, valueFlags = Set("-O")),
    // pure sources: operands are data/arguments, there is no input stream
    Annotation("echo", List(Clause(Always, NonParallel, Nil, out))),
    Annotation("seq", List(Clause(Always, NonParallel, Nil, out))),
    simple("file", Stateless), // per-operand type detection, used via xargs

    // --- higher-order ----------------------------------------------------
    Annotation("xargs",
      List(Clause(Always, SideEffectful, filterIn, out)),
      valueFlags = Set("-n", "-I", "-P"), higherOrder = true),
  ).map(a => a.name -> a).toMap

  /** Commands whose only effect is a read-only fetch: under `xargs` they
    * behave as a per-line pure map (URL line → body lines), hence (S). */
  val readOnlyFetch: Set[String] = Set("curl", "wget", "cat", "file", "wc")

  /** Resolve an invocation to its parallelizability view.
    *
    * `xargs cmd args...` is higher-order (§3.2): its class is derived from
    * the invoked command — (S) if the inner command is per-item pure.
    */
  def resolve(name: String, args: List[String]): Resolved = {
    records.get(name) match {
      case Some(a) if a.higherOrder =>
        val inner = args.dropWhile(w => w.startsWith("-") || w.matches("[0-9]+"))
        val innerCls = inner match {
          case cmd :: innerArgs =>
            val r = resolve(cmd, innerArgs)
            if (r.cls == Stateless || r.cls == Pure) Stateless
            else if (readOnlyFetch.contains(cmd)) Stateless
            else SideEffectful
          case Nil => SideEffectful
        }
        val (flags, flagVals, operands) = a.splitArgs(args)
        Resolved(name, args, innerCls, List(StreamSpec.Std), List(StreamSpec.Std),
                 None, flags, operands, flagVals)
      case Some(a) => a.resolve(args)
      case None =>
        // bare class from the study lists; conservative stdin→stdout wiring
        val cls = studyClass.getOrElse(name, SideEffectful)
        Resolved(name, args, cls, List(StreamSpec.Std), List(StreamSpec.Std),
                 None, Set.empty, args.filterNot(_.startsWith("-")))
    }
  }

  // -------------------------------------------------------- Tab. 1 study

  /** GNU Coreutils classification (100 commands). Individual assignments
    * are ours — the paper publishes only the counts (22/8/13/57). */
  val coreutils: List[(String, PClass)] = {
    val s = List("base32", "base64", "basenc", "basename", "cat", "cut",
      "dirname", "echo", "expand", "factor", "false", "fold", "numfmt",
      "paste", "pathchk", "printf", "realpath", "seq", "tr", "true",
      "unexpand", "yes").map(_ -> Stateless)
    val p = List("head", "nl", "shuf", "sort", "tac", "tail", "uniq", "wc")
      .map(_ -> Pure)
    val n = List("b2sum", "cksum", "md5sum", "od", "pr", "ptx", "sha1sum",
      "sha224sum", "sha256sum", "sha384sum", "sha512sum", "sum", "tsort")
      .map(_ -> NonParallel)
    val e = List("arch", "chcon", "chgrp", "chmod", "chown", "chroot", "cp",
      "csplit", "date", "dd", "df", "dir", "dircolors", "du", "env",
      "groups", "hostid", "hostname", "id", "install", "kill", "link", "ln",
      "logname", "ls", "mkdir", "mkfifo", "mknod", "mktemp", "mv", "nice",
      "nohup", "nproc", "pinky", "pwd", "readlink", "rm", "rmdir", "runcon",
      "shred", "sleep", "split", "stat", "stdbuf", "stty", "sync", "tee",
      "test", "timeout", "touch", "truncate", "tty", "uname", "unlink",
      "uptime", "users", "vdir").map(_ -> SideEffectful)
    s ++ p ++ n ++ e
  }

  /** POSIX utilities classification (155 commands). */
  val posix: List[(String, PClass)] = {
    val s = List("asa", "basename", "cat", "col", "cut", "dd", "dirname",
      "echo", "egrep", "expand", "expr", "false", "fgrep", "fold", "grep",
      "iconv", "paste", "pathchk", "printf", "sed", "strings", "test", "tr",
      "true", "unexpand", "uudecode", "uuencode", "what").map(_ -> Stateless)
    val p = List("comm", "head", "join", "nl", "sort", "tail", "tsort",
      "uniq", "wc").map(_ -> Pure)
    val n = List("awk", "bc", "c99", "cksum", "cmp", "compress", "diff",
      "lex", "m4", "od", "pr", "uncompress", "yacc").map(_ -> NonParallel)
    val e = List("admin", "alias", "ar", "at", "batch", "bg", "cal", "cd",
      "cflow", "chgrp", "chmod", "chown", "cp", "crontab", "csplit",
      "ctags", "date", "delta", "df", "du", "ed", "env", "ex", "fc", "fg",
      "file", "find", "fuser", "gencat", "get", "getconf", "getopts",
      "hash", "id", "ipcrm", "ipcs", "jobs", "kill", "link", "ln",
      "locale", "localedef", "logger", "logname", "lp", "ls", "mailx",
      "make", "man", "mkdir", "mkfifo", "mknod", "more", "mv",
      "newgrp", "nice", "nm", "nohup", "patch", "pax", "prs", "ps", "pwd",
      "qalter", "qdel", "qhold", "qmove", "qmsg", "qrerun", "qrls",
      "qselect", "qsig", "qstat", "qsub", "read", "renice", "rm", "rmdel",
      "rmdir", "sact", "sccs", "sh", "sleep", "split", "stty", "tabs",
      "tee", "time", "touch", "tput", "tty", "type", "ulimit",
      "umask", "unalias", "uname", "unget", "unlink", "uucp", "uustat",
      "uux", "val", "vi", "who", "xargs")
      .map(_ -> SideEffectful)
    s ++ p ++ n ++ e
  }

  private val studyClass: Map[String, PClass] =
    (coreutils ++ posix).toMap

  /** Tab. 1 counts: class → (coreutils count, posix count). */
  def study: Map[PClass, (Int, Int)] =
    PClass.all.map { c =>
      c -> (coreutils.count(_._2 == c), posix.count(_._2 == c))
    }.toMap
}
