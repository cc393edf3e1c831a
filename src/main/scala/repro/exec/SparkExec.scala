package repro.exec

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession
import org.apache.spark.storage.StorageLevel

import repro.cmds.Kernels
import repro.cmds.Kernels.Ctx
import repro.core.Dfg._
import repro.core.PClass

/** Spark executor for PaSh DFGs (repro band: distributed_dataflow).
  *
  * Stream order is semantic in the shell, so edges are `RDD[String]` whose
  * (partitionIndex, withinPartitionOffset) order *is* the byte-stream
  * order — exactly the layer where Spark preserves order through narrow
  * transformations. Mapping:
  *
  *  - (S) command  → `mapPartitions` with the shared per-line kernel
  *    (parallel across however many chunk-partitions feed it);
  *  - `cat`        → `union` (partition concatenation, order-preserving);
  *  - (P)/(N) node → order-preserving gather to one partition (a real
  *    shuffle, i.e. a stage boundary — Spark's analogue of PaSh's single
  *    aggregator process) + whole-stream kernel;
  *  - map replica  → whole-stream kernel over its chunk;
  *  - aggregate    → gather both inputs, merge with the shared aggregator;
  *  - `split`      → count + contiguous index ranges over a cached input
  *    (faithful to PaSh's line-counting split, which also consumes its
  *    whole input before dispersing it);
  *  - relay        → identity (Spark tasks have no shell laziness; the
  *    eager/blocking distinction is studied on the discrete-event
  *    simulator instead — DESIGN.md).
  *
  * The *sequential baseline* is the untransformed DFG: every node sees a
  * 1-partition stream, so the whole region collapses into a single-core
  * task chain, like `sh` on one CPU.
  */
final class SparkExec(spark: SparkSession, store: Store) {

  private val sc = spark.sparkContext

  private val persisted = collection.mutable.ListBuffer.empty[RDD[_]]

  /** Stage boundary: cache the given streams and force them in ONE
    * parallel job, so each chunk's upstream kernel chain runs as its own
    * task; downstream narrow consumers then read the in-process cache
    * (deserialized, zero-copy in local mode — cheaper than a shuffle). */
  private def materialize(streams: List[RDD[String]]): List[RDD[String]] = {
    val cached = streams.map(_.persist(StorageLevel.MEMORY_AND_DISK))
    persisted ++= cached
    (cached match {
      case one :: Nil => one
      case many       => sc.union(many)
    }).count()
    cached
  }

  /** Order-preserving gather of a multi-partition stream into one task's
    * iterator: parallel materialization + narrow in-order coalesce. */
  private def gather(rdd: RDD[String]): RDD[String] =
    if (rdd.getNumPartitions <= 1) rdd
    else materialize(List(rdd)).head.coalesce(1)

  /** Materialize an edge inside a single task (inputs are already 1-part). */
  private def wholeKernel(r: repro.core.Annotations.Resolved, ctx: Ctx,
                          streams: List[RDD[String]]): RDD[String] = {
    val gathered = streams.map(gather)
    val tagged = gathered.zipWithIndex.map { case (s, i) =>
      s.mapPartitions(it => it.map((i, _)), preservesPartitioning = true)
    }
    val one = tagged match {
      case Nil      => sc.parallelize(Seq.empty[(Int, String)], 1)
      case x :: Nil => x
      case many     => sc.union(many).coalesce(1)
    }
    val nStreams = streams.size
    one.mapPartitions { it =>
      val buckets = Array.fill(nStreams)(Vector.newBuilder[String])
      it.foreach { case (i, l) => buckets(i) += l }
      Kernels.whole(r)(ctx)(buckets.map(_.result()).toList).iterator
    }
  }

  /** Evaluate a region; returns stdout/file-sink RDDs (not yet collected). */
  def eval(g: Graph): (List[RDD[String]], Map[String, RDD[String]]) = {
    val fetch  = store.fetchFn
    val values = collection.mutable.Map.empty[Int, RDD[String]]

    def edgeIn(e: DEdge): RDD[String] = e.src match {
      case Some(SrcFile(f))           => store.rdd(f)
      case Some(SrcFilePart(f, i, o)) => store.rddPart(f, i, o)
      case None                       => values(e.id)
    }

    // Maximal same-key aggregate trees are evaluated at their root as ONE
    // n-ary merge task (aggregators are associative; Kernels.aggN) — the
    // map replicas upstream become one parallel shuffle-map stage and the
    // whole merge is a single pass instead of a cascade of pairwise
    // merges. Internal tree aggs (and the relays wired between levels)
    // are skipped.
    def producerOf(e: Int): Option[DNode] = g.edges(e).from.map(g.nodes)
    val internalAggs: Set[Int] = g.nodes.values.collect {
      case DNode(_, AggOp(key, _), ins, _) =>
        ins.flatMap { e0 =>
          def chase(e: Int): Option[Int] = producerOf(e) match {
            case Some(DNode(_, RelayOp(_, _), rins, _)) => chase(rins.head)
            case Some(DNode(pid, AggOp(k2, _), _, _)) if k2 == key => Some(pid)
            case _ => None
          }
          chase(e0)
        }
    }.flatten.toSet

    g.topo.foreach { n =>
      val inEdges = n.ins.map(g.edges)
      // statics are small configuration inputs (dictionaries): driver-side
      val statics = inEdges.filter(_.static).map(e => e.src match {
        case Some(SrcFile(f))           => store.fetch(f)
        case Some(SrcFilePart(f, i, o)) => store.fetchPart(f, i, o)
        case None                       => values(e.id).collect().toVector
      }).toList
      val streams = inEdges.filterNot(_.static).map(edgeIn).toList
      val ctx     = Ctx(statics, fetch)

      val outs: Vector[RDD[String]] = n.op match {
        case CmdOp(r) if r.cls == PClass.Stateless =>
          // parallel per-line kernel across all chunk partitions
          val in = streams.head
          Kernels.stateless(r) match {
            case Some(mk) =>
              Vector(in.mapPartitions({ it =>
                val f = mk(ctx); it.flatMap(l => f(l))
              }, preservesPartitioning = true))
            case None =>
              // stateless law ⇒ whole-kernel per partition is equivalent
              Vector(in.mapPartitions({ it =>
                Kernels.whole(r)(ctx)(List(it.toVector)).iterator
              }, preservesPartitioning = true))
          }
        case CmdOp(r) => Vector(wholeKernel(r, ctx, streams))
        case MapOp(r) => Vector(wholeKernel(r, ctx, streams))
        case AggOp(_, _) if internalAggs.contains(n.id) =>
          Vector(null) // folded into the tree root's n-ary merge

        case AggOp(key, r) =>
          // in-order leaves of the maximal same-key aggregate tree
          def leavesOf(node: DNode): Vector[Int] =
            node.ins.filterNot(e => g.edges(e).static).flatMap(leafOf)
          def leafOf(e: Int): Vector[Int] = producerOf(e) match {
            case Some(DNode(_, RelayOp(_, _), rins, _)) => leafOf(rins.head)
            case Some(p @ DNode(_, AggOp(k2, _), _, _)) if k2 == key => leavesOf(p)
            case _ => Vector(e)
          }
          val leafEdges = leavesOf(n)
          // one parallel job materializes every map replica, then a single
          // narrow task runs the n-ary merge over the cached chunks
          val cached = materialize(leafEdges.toList.map(e => edgeIn(g.edges(e))))
          val tagged = cached.zipWithIndex.map { case (s, i) => s.map((i, _)) }
          val nLeaves = leafEdges.size
          Vector(sc.union(tagged).coalesce(1).mapPartitions { it =>
            val buckets = Array.fill(nLeaves)(Vector.newBuilder[String])
            it.foreach { case (i, l) => buckets(i) += l }
            Kernels.aggN(key, r, buckets.map(_.result()).toList).iterator
          })
        case SplitOp(w) =>
          // PaSh's split counts lines first, then disperses contiguously
          val zipped = streams.head.zipWithIndex()
            .persist(StorageLevel.MEMORY_AND_DISK)
          persisted += zipped
          val n0 = zipped.count()
          Vector.tabulate(w) { i =>
            val lo = n0 * i / w
            val hi = n0 * (i + 1) / w
            zipped.filter { case (_, idx) => idx >= lo && idx < hi }.map(_._1)
          }
        case CatOp =>
          Vector(streams match {
            case s :: Nil => s
            case many     => sc.union(many)
          })
        case RelayOp(_, _) => Vector(streams.head)
      }
      n.outs.zip(outs).foreach { case (e, v) => values(e) = v }
    }

    val stdout = List.newBuilder[RDD[String]]
    val sinks  = Map.newBuilder[String, RDD[String]]
    g.outputs.foreach { e =>
      val v = values.getOrElse(e.id, sc.parallelize(Seq.empty[String], 1))
      e.sink match {
        case Some(f) => sinks += f -> v
        case None    => stdout += v
      }
    }
    (stdout.result(), sinks.result())
  }

  /** Run one region and collect results (order = partition order). */
  def run(g: Graph): RefExec.Out = {
    val (stdouts, sinks) = eval(g)
    val out = RefExec.Out(
      stdouts.flatMap(_.collect()).toVector,
      sinks.map { case (f, r) => f -> r.collect().toVector },
    )
    releaseCaches()
    out
  }

  /** Run a program region-by-region; sinks feed later regions via store. */
  def runProgram(regions: List[Graph]): RefExec.Out = {
    val stdout = Vector.newBuilder[String]
    val files  = collection.mutable.Map.empty[String, Vector[String]]
    regions.foreach { g =>
      val o = run(g)
      stdout ++= o.stdout
      o.files.foreach { case (f, v) => files(f) = v; store.addLines(f, v) }
    }
    RefExec.Out(stdout.result(), files.toMap)
  }

  private def releaseCaches(): Unit = {
    persisted.foreach(_.unpersist(blocking = false))
    persisted.clear()
  }
}
