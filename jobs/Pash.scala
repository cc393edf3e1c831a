package jobs

import repro.core.Compiler
import repro.core.Transform.{EagerBlocking, EagerOff, EagerOn, PashConfig}

/** The `pash` CLI analog: compile a shell script to its parallel form.
  *
  * {{{
  * sbt "runMain jobs.Pash --width 8 'cat in.txt | tr A-Z a-z | sort'"
  * }}}
  *
  * Prints the emitted parallel shell script (named pipes, background jobs,
  * wait + PIPE cleanup) plus DFG statistics — the artifact of Fig. 3.
  */
object Pash {
  def main(args: Array[String]): Unit = {
    var width = 2
    var split = true
    var eager: repro.core.Transform.EagerMode = EagerOn
    val rest  = collection.mutable.ListBuffer.empty[String]
    var i = 0
    while (i < args.length) {
      args(i) match {
        case "--width"     => width = args(i + 1).toInt; i += 2
        case "--no-split"  => split = false; i += 1
        case "--no-eager"  => eager = EagerOff; i += 1
        case "--blocking-eager" => eager = EagerBlocking; i += 1
        case a             => rest += a; i += 1
      }
    }
    val script = rest.mkString(" ")
    require(script.nonEmpty, "usage: Pash [--width N] [--no-split] [--no-eager] '<script>'")
    val res = Compiler.pash(script, PashConfig(width, split, eager))
    println(res.script)
    println(f"# ${res.stats.show}; compiled in ${res.compileMillis}%.1f ms")
  }
}
