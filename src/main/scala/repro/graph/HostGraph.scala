package repro.graph

import java.util.concurrent.atomic.AtomicLong
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A graph materialized for the shared-memory kernels.
  *
  * Holds the symmetric CSR adjacency (`offsets`/`targets`, both edge
  * directions present) and the undirected edge list packed into
  * fixed-size chunks (`chunks`, each element `(u.toLong << 32) | v` with
  * u < v). Registered in [[SharedState]] under `id` so Spark tasks can
  * reach it without closure capture.
  *
  * `m` counts undirected edges (after symmetrize + dedupe + self-loop
  * removal); `targets.length == 2 * m`.
  */
final class HostGraph private (
    val id: String,
    val n: Int,
    val offsets: Array[Int],  // length n + 1
    val targets: Array[Int],  // length 2m
    val chunks: Array[Array[Long]],
    val loadTimeSec: Double,
) extends Serializable {

  def m: Long = targets.length / 2L

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Undirected edge count per chunk (for throughput math). */
  def chunkSizes: Array[Int] = chunks.map(_.length)

  /** Iterate undirected edges on the driver (tests / reference only). */
  def edgeIterator: Iterator[(Int, Int)] =
    chunks.iterator.flatMap(_.iterator.map(p => ((p >>> 32).toInt, (p & 0xffffffffL).toInt)))

  def unregister(): Unit = SharedState.remove(HostGraph.key(id))
}

object HostGraph {
  private val counter = new AtomicLong(0)
  private[graph] def key(id: String) = s"graph:$id"

  def lookup(id: String): HostGraph = SharedState.get[HostGraph](key(id))

  /** Build from a directed edge DataFrame with columns (u, v).
    *
    * Symmetrization, dedupe and self-loop removal run through Catalyst
    * (DataFrame union/filter/distinct); the CSR build itself is a driver
    * array pass, timed as the paper's "load time" (Table 2).
    *
    * @param nOverride force vertex count (to include isolated vertices
    *                  beyond max id), mirroring web graphs where a large
    *                  fraction of ids never appear in edges.
    */
  def fromEdges(spark: SparkSession, edges: DataFrame,
                nOverride: Int = -1, chunkTarget: Int = -1): HostGraph = {
    val t0 = System.nanoTime()
    // Canonical undirected edge set via Catalyst: orient u < v, drop
    // self-loops, dedupe.
    val canon = edges
      .select(least(col("u"), col("v")).cast("int").as("u"),
              greatest(col("u"), col("v")).cast("int").as("v"))
      .where(col("u") =!= col("v"))
      .distinct()
      .select((col("u").cast("long") * lit(1L << 32) + col("v")).as("p"))
    val packed: Array[Long] = canon.collect().map(_.getLong(0))
    java.util.Arrays.sort(packed)

    val maxId = if (packed.isEmpty) 0 else packed.iterator.map(p => (p & 0xffffffffL).toInt).max
    val n = math.max(nOverride, maxId + 1)

    // degree count (both directions)
    val deg = new Array[Int](n)
    var i = 0
    while (i < packed.length) {
      val u = (packed(i) >>> 32).toInt; val v = (packed(i) & 0xffffffffL).toInt
      deg(u) += 1; deg(v) += 1
      i += 1
    }
    val offsets = new Array[Int](n + 1)
    i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }
    val targets = new Array[Int](offsets(n))
    val cursor = java.util.Arrays.copyOf(offsets, n)
    i = 0
    while (i < packed.length) {
      val u = (packed(i) >>> 32).toInt; val v = (packed(i) & 0xffffffffL).toInt
      targets(cursor(u)) = v; cursor(u) += 1
      targets(cursor(v)) = u; cursor(v) += 1
      i += 1
    }

    // chunk the undirected edges for edge-parallel kernels
    val nChunks0 =
      if (chunkTarget > 0) chunkTarget
      else math.max(1, 2 * spark.sparkContext.defaultParallelism)
    val nChunks = math.max(1, math.min(nChunks0, math.max(1, packed.length)))
    val chunks = new Array[Array[Long]](nChunks)
    val per = (packed.length + nChunks - 1) / math.max(1, nChunks)
    var c = 0
    while (c < nChunks) {
      val lo = c * per
      val hi = math.min(packed.length, lo + per)
      chunks(c) = if (lo >= hi) Array.emptyLongArray
                  else java.util.Arrays.copyOfRange(packed, lo, hi)
      c += 1
    }

    val id = s"g${counter.incrementAndGet()}"
    val g = new HostGraph(id, n, offsets, targets, chunks,
                          (System.nanoTime() - t0) / 1e9)
    SharedState.put(key(id), g)
    g
  }

  /** Build directly from an undirected edge array (tests, streams). */
  def fromArray(spark: SparkSession, n: Int, edges: Array[(Int, Int)]): HostGraph = {
    import spark.implicits._
    val df = spark.createDataset(edges.toIndexedSeq).toDF("u", "v")
    fromEdges(spark, df, nOverride = n)
  }
}
