package repro.exec

import org.apache.spark.SparkContext
import org.apache.spark.rdd.RDD

/** Synthetic file/URL store backing both executors.
  *
  * Every "file" is `(lineCount, pure line generator)` so that (i) the
  * reference interpreter, the Spark driver, and Spark executors all see the
  * same bytes without shipping data, and (ii) chunked parallel reads
  * (`SrcFilePart`) are just contiguous sub-ranges of the generator domain.
  *
  * URLs (the NOAA/Wikipedia scripts fetch over HTTP/FTP in the paper) are
  * names like any other: the store is the network substitute (DESIGN.md).
  */
object Store {
  /** Pure description of a synthetic file (top-level so that closures over
    * it never capture a Store instance — Spark ships these to executors). */
  final case class GenFile(n: Long, gen: Long => String) extends Serializable
}

final class Store(@transient private val sc: SparkContext) {
  import Store.GenFile

  /** Alias so call sites can write `store.GenFile(...)`. */
  val GenFile: Store.GenFile.type = Store.GenFile

  private val files = collection.mutable.Map.empty[String, GenFile]
  private var fallbacks: List[String => Option[GenFile]] = Nil

  def add(name: String, n: Long, gen: Long => String): this.type = {
    files(name) = GenFile(n, gen); this
  }

  def addLines(name: String, lines: Vector[String]): this.type =
    add(name, lines.size.toLong, i => lines(i.toInt))

  /** Pattern-based lazy files (e.g. every URL under a dataset prefix). */
  def addFallback(f: String => Option[GenFile]): this.type = {
    fallbacks = fallbacks :+ f; this
  }

  private def lookup(name: String): GenFile =
    files.getOrElse(name,
      fallbacks.view.flatMap(_(name)).headOption.getOrElse(
        throw new IllegalArgumentException(s"store: no such file '$name'")))

  def exists(name: String): Boolean =
    files.contains(name) || fallbacks.exists(_(name).isDefined)

  /** Driver-side materialization (small inputs, statics, oracle checks). */
  def fetch(name: String): Vector[String] = {
    val f = lookup(name)
    Vector.tabulate(f.n.toInt)(i => f.gen(i.toLong))
  }

  /** Serializable fetch function for executor-side use (`xargs curl`). */
  def fetchFn: String => Vector[String] = {
    val snapshot = files.toMap
    val fb       = fallbacks
    (name: String) => {
      val f = snapshot.getOrElse(name,
        fb.view.flatMap(_(name)).headOption.getOrElse(
          throw new IllegalArgumentException(s"store: no such file '$name'")))
      Vector.tabulate(f.n.toInt)(i => f.gen(i.toLong))
    }
  }

  /** The file as an ordered RDD with `parts` contiguous partitions. */
  def rdd(name: String, parts: Int = 1): RDD[String] = {
    val f = lookup(name)
    sc.range(0L, f.n, 1L, math.max(1, parts)).map(f.gen)
  }

  /** Chunk `i` of `of` as a true single-partition RDD (parallel chunked
    * file read — boundaries match [[fetchPart]] exactly). */
  def rddPart(name: String, i: Int, of: Int): RDD[String] = {
    val f  = lookup(name)
    val lo = f.n * i / of
    val hi = f.n * (i + 1) / of
    sc.range(lo, hi, 1L, 1).map(f.gen)
  }

  /** Contiguous line chunk for the reference executor. */
  def fetchPart(name: String, i: Int, of: Int): Vector[String] = {
    val v  = fetch(name)
    val n  = v.size.toLong
    val lo = (n * i / of).toInt
    val hi = (n * (i + 1) / of).toInt
    v.slice(lo, hi)
  }
}
