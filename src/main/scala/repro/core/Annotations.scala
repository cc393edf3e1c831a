package repro.core

/** PaSh's lightweight annotation language (§3.2).
  *
  * An [[Annotation]] describes one command: a list of [[Clause]]s, each
  * guarded by a predicate over the command's flags (concern C3), assigning a
  * parallelizability class (C1) and the ordered inputs/outputs (C2). The
  * first matching clause wins; a conservative default applies otherwise.
  */
object Annotations {

  // ------------------------------------------------------------ predicates

  /** Predicate over the invocation's flag set — the paper's 6-operator
    * language: flag presence, ∧, ∨, ¬, ⊤, and a regex over raw args. */
  sealed trait Pred {
    def eval(flags: Set[String], args: List[String]): Boolean = this match {
      case Flag(f)       => flags.contains(f)
      case AndP(a, b)    => a.eval(flags, args) && b.eval(flags, args)
      case OrP(a, b)     => a.eval(flags, args) || b.eval(flags, args)
      case NotP(a)       => !a.eval(flags, args)
      case Always        => true
      case ArgMatch(re)  => args.exists(_.matches(re))
    }
    def &&(other: Pred): Pred = AndP(this, other)
    def ||(other: Pred): Pred = OrP(this, other)
    def unary_! : Pred        = NotP(this)
  }
  final case class Flag(f: String)      extends Pred
  final case class AndP(a: Pred, b: Pred) extends Pred
  final case class OrP(a: Pred, b: Pred)  extends Pred
  final case class NotP(a: Pred)        extends Pred
  case object Always                    extends Pred
  final case class ArgMatch(re: String) extends Pred

  // -------------------------------------------------------------- io specs

  /** Symbolic reference to a stream position, resolved against operands. */
  sealed trait IoRef
  case object StdinRef                extends IoRef
  case object StdoutRef               extends IoRef
  /** i-th operand (non-flag argument), 0-based. */
  final case class OperandRef(i: Int) extends IoRef
  /** All operands, in order; if none, stdin (UNIX filter convention). */
  case object AllOperandsOrStdin      extends IoRef
  /** Operand files from index `i` on (earlier operands are arguments, e.g.
    * grep's pattern or sed's script); stdin if none. */
  final case class OperandsFrom(i: Int) extends IoRef

  /** An input slot: `static` inputs are configuration read in full before
    * the streaming input (e.g. `comm -13 dict -`'s first file). */
  final case class In(ref: IoRef, static: Boolean = false)

  // --------------------------------------------------------------- clauses

  /** One clause of an annotation record. `agg` names the aggregator used to
    * merge partial outputs when `cls == Pure` (None ⇒ not parallelizable in
    * practice even though pure). */
  final case class Clause(
      pred: Pred,
      cls: PClass,
      inputs: List[In],
      outputs: List[IoRef],
      agg: Option[String] = None,
  )

  /** Full annotation record for one command. */
  final case class Annotation(
      name: String,
      clauses: List[Clause],
      /** Flags that consume the following argument (e.g. `-n 5`). */
      valueFlags: Set[String] = Set.empty,
      /** `stdin-hyphen`: operand `-` denotes stdin. */
      stdinHyphen: Boolean = false,
      /** `short-combined`: `-13` means `-1 -3`. */
      shortCombined: Boolean = false,
      /** Higher-order commands (xargs): class comes from the invoked cmd. */
      higherOrder: Boolean = false,
  ) {

    /** Split raw args into (flag set, flag → value, operands). */
    def splitArgs(args: List[String]): (Set[String], Map[String, String], List[String]) = {
      val flags    = Set.newBuilder[String]
      val vals     = Map.newBuilder[String, String]
      val operands = List.newBuilder[String]
      var rest = args
      while (rest.nonEmpty) {
        val a = rest.head
        rest = rest.tail
        if (a == "-" && stdinHyphen) operands += a
        else if (a.startsWith("--")) {
          val f = a.takeWhile(_ != '=')
          flags += f
          if (a.contains('=')) vals += f -> a.dropWhile(_ != '=').drop(1)
        } else if (a.startsWith("-") && a.length > 1) {
          if (valueFlags.contains(a.take(2))) {
            val f = a.take(2)
            flags += f
            // value either glued (-n1) or separate (-n 1)
            if (a.length > 2) vals += f -> a.drop(2)
            else if (rest.nonEmpty) { vals += f -> rest.head; rest = rest.tail }
          } else if (shortCombined) {
            a.drop(1).foreach(c => flags += s"-$c")
          } else flags += a
        } else operands += a
      }
      (flags.result(), vals.result(), operands.result())
    }

    /** Resolve the matching clause for an invocation. */
    def resolve(args: List[String]): Resolved = {
      val (flags, flagVals, operands) = splitArgs(args)
      val clause = clauses.find(_.pred.eval(flags, args)).getOrElse(
        Clause(Always, PClass.SideEffectful, List(In(StdinRef)), List(StdoutRef)))
      def refToStreams(r: IoRef, static: Boolean): List[StreamSpec] = r match {
        case StdinRef   => List(StreamSpec.Std)
        case StdoutRef  => List(StreamSpec.Std)
        case OperandRef(i) =>
          operands.lift(i) match {
            case Some("-") if stdinHyphen => List(StreamSpec.Std)
            case Some(f)                  => List(StreamSpec.File(f, static))
            case None                     => List(StreamSpec.Std)
          }
        case AllOperandsOrStdin =>
          if (operands.isEmpty) List(StreamSpec.Std)
          else operands.map {
            case "-" if stdinHyphen => StreamSpec.Std
            case f                  => StreamSpec.File(f, static)
          }
        case OperandsFrom(i) =>
          val files = operands.drop(i)
          if (files.isEmpty) List(StreamSpec.Std)
          else files.map {
            case "-" if stdinHyphen => StreamSpec.Std
            case f                  => StreamSpec.File(f, static)
          }
      }
      val ins = clause.inputs.flatMap(in => refToStreams(in.ref, in.static).map {
        case StreamSpec.File(f, _) => StreamSpec.File(f, in.static)
        case s                     => s
      })
      val outs = clause.outputs.flatMap(refToStreams(_, static = false))
      Resolved(name, args, clause.cls, ins, outs, clause.agg, flags, operands, flagVals)
    }
  }

  /** Concrete stream endpoint after resolving operand references. */
  sealed trait StreamSpec
  object StreamSpec {
    /** stdin/stdout — wired to the surrounding pipeline. */
    case object Std extends StreamSpec
    final case class File(path: String, static: Boolean) extends StreamSpec
  }

  /** The resolved view of one command invocation. */
  final case class Resolved(
      name: String,
      args: List[String],
      cls: PClass,
      inputs: List[StreamSpec],
      outputs: List[StreamSpec],
      agg: Option[String],
      flags: Set[String],
      operands: List[String],
      flagVals: Map[String, String] = Map.empty,
  )
}
