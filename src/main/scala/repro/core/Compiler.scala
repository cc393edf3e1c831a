package repro.core

import Dfg.Graph
import Transform.PashConfig

/** End-to-end PaSh compiler: parse → dataflow regions → parallelization
  * transforms → emitted parallel script + statistics (§2.3, Fig. 1).
  */
object Compiler {

  final case class CompileResult(
      sequential: List[Graph],
      parallel: List[Graph],
      script: String,
      stats: Backend.Stats,
      compileMillis: Double,
  )

  /** Compile `src` at the given width/config. `env0` seeds the static
    * environment (rarely needed — scripts usually set their own vars). */
  def pash(src: String, cfg: PashConfig,
           env0: Map[String, String] = Map.empty): CompileResult = {
    val t0       = System.nanoTime()
    val compiled = Frontend.compile(src, env0)
    val par      = compiled.regions.map(Transform.parallelize(_, cfg))
    val script   = par.map(Backend.emit(_).script).mkString("\n")
    val stats    = Backend.stats(par)
    val ms       = (System.nanoTime() - t0) / 1e6
    CompileResult(compiled.regions, par, script, stats, ms)
  }

  /** The incorrect chunk-and-concat variant (§6.5 GNU-parallel misuse). */
  def naive(src: String, cfg: PashConfig,
            env0: Map[String, String] = Map.empty): CompileResult = {
    val t0       = System.nanoTime()
    val compiled = Frontend.compile(src, env0)
    val par      = compiled.regions.map(Transform.naiveParallel(_, cfg))
    val script   = par.map(Backend.emit(_).script).mkString("\n")
    val stats    = Backend.stats(par)
    val ms       = (System.nanoTime() - t0) / 1e6
    CompileResult(compiled.regions, par, script, stats, ms)
  }
}
