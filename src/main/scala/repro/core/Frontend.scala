package repro.core

import Ast._
import Annotations.{Resolved, StreamSpec}
import Dfg._

/** Frontend (§4.1): identify dataflow regions in the shell AST and lift
  * each to a DFG.
  *
  * Region rules follow the paper: pipes (`|`) and parallel composition
  * (`&`) compose regions; `;`, `&&`, `||`, assignments and loop boundaries
  * are barriers. `for` loops are unrolled (iterations are sequential in
  * POSIX), with the loop variable bound in the static environment so words
  * like `"$base/$y"` expand during translation. A word whose expansion is
  * unknown makes its command conservatively side-effectful — the region
  * still builds (so it can execute) but the node is never parallelized.
  */
object Frontend {

  /** A compiled program: dataflow regions in execution order. */
  final case class Compiled(regions: List[Graph])

  def compile(src: String, env0: Map[String, String] = Map.empty): Compiled = {
    val env     = collection.mutable.Map[String, String](env0.toSeq: _*)
    val regions = List.newBuilder[Graph]

    def walk(node: Node): Unit = node match {
      case Noop             => ()
      case Semi(l, r)       => walk(l); walk(r)
      case And(l, r)        => walk(l); walk(r) // barrier; both sides compile
      case Or(l, r)         => walk(l); walk(r)
      case Subshell(b)      => walk(b)
      case Amp(l, r)        => walk(l); walk(r) // task-parallel; order-safe
      case Assign(n, v)     =>
        env(n) = v.expand(env.toMap).getOrElse(
          throw new IllegalArgumentException(s"dynamic assignment to $n"))
      case For(v, items, body) =>
        items.foreach { it =>
          val value = it.expand(env.toMap).getOrElse(
            throw new IllegalArgumentException(s"dynamic loop item for $v"))
          env(v) = value
          walk(body)
        }
        env.remove(v)
      case p: Pipe          => regions += pipeToDfg(p.stages, env.toMap)
      case c: Cmd           => regions += pipeToDfg(List(c), env.toMap)
    }

    walk(Parser.parse(src))
    Compiled(regions.result())
  }

  /** Resolve one command stage against the annotation library. Unknown
    * expansions degrade to side-effectful (conservative default, §4.1). */
  def resolveStage(c: Cmd, env: Map[String, String]): Resolved = {
    val nameE = c.name.expand(env)
    val argsE = c.args.map(_.expand(env))
    if (nameE.isEmpty || argsE.exists(_.isEmpty))
      Resolved(nameE.getOrElse("<dynamic>"), argsE.flatten,
               PClass.SideEffectful, List(StreamSpec.Std), List(StreamSpec.Std),
               None, Set.empty, Nil)
    else AnnotationLib.resolve(nameE.get, argsE.map(_.get))
  }

  /** Build the DFG for one pipeline (auxiliary transform t1 applied: a
    * command with several streaming file inputs reads them via a cat). */
  def pipeToDfg(stages: List[Node], env: Map[String, String]): Graph = {
    val b = new Builder
    var prevOut: Option[Int] = None // stdout edge of the previous stage

    stages.foreach {
      case c: Cmd =>
        val r = resolveStage(c, env)

        val redirIn  = c.redirs.collectFirst { case RedirIn(t)  => t.expand(env) }.flatten
        val redirOut = c.redirs.collectFirst {
          case RedirOut(t) => t.expand(env)
          case RedirAppend(t) => t.expand(env)
        }.flatten

        // Static (configuration) inputs: replicated under parallelization.
        val staticEdges = r.inputs.collect {
          case StreamSpec.File(f, true) => b.freshEdge(Some(SrcFile(f)), static = true)
        }

        // Streaming inputs, in consumption order.
        val streamSpecs = r.inputs.filter {
          case StreamSpec.File(_, true) => false
          case _                        => true
        }
        val streamEdges: Vector[Int] = {
          val fromSpecs = streamSpecs.flatMap {
            case StreamSpec.Std =>
              prevOut match {
                case Some(e) => List(e)
                case None    =>
                  redirIn match {
                    case Some(f) => List(b.freshEdge(Some(SrcFile(f))))
                    case None    => Nil // true source command (curl url…)
                  }
              }
            case StreamSpec.File(f, _) => List(b.freshEdge(Some(SrcFile(f))))
          }
          // curl/echo-style sources name their target in operands
          val withSource =
            if (fromSpecs.isEmpty && r.operands.nonEmpty &&
                (r.name == "curl" || r.name == "wget"))
              List(b.freshEdge(Some(SrcFile(r.operands.head))))
            else fromSpecs
          withSource.toVector
        }

        // t1: many streaming inputs → concatenate through a cat node first.
        val streaming: Vector[Int] =
          if (streamEdges.size > 1 && r.name != "comm" && r.name != "join"
              && r.name != "paste" && r.name != "diff") {
            val out = b.freshEdge()
            b.addNode(CatOp, streamEdges, Vector(out))
            Vector(out)
          } else streamEdges

        val outEdge = b.freshEdge()
        redirOut.foreach(f => b.setSink(outEdge, f))
        b.addNode(CmdOp(r), staticEdges.toVector ++ streaming, Vector(outEdge))
        prevOut = Some(outEdge)

      case other =>
        throw new IllegalArgumentException(s"unsupported pipeline stage: $other")
    }
    b.result()
  }
}
