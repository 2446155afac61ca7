package repro.dataflow

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Pure-DataFrame (Catalyst) connectivity: iterated neighbourhood-min
  * label propagation over shuffle joins.
  *
  * This is the distributed-dataflow expression of the min-based family —
  * the form ConnectIt's algorithms would take on an actual cluster. It
  * cross-checks the shared-memory kernels in tests and serves as a
  * dataflow baseline; it converges in O(diameter) iterations, each a
  * full shuffle join, which is exactly why the paper's shared-memory
  * algorithms exist.
  */
object DataflowCC {

  /** Connected components of an edge DataFrame (columns u, v; any
    * direction). Returns (v, label) with label = min vertex id of v's
    * component. `nOverride` adds isolated vertices [0, n).
    */
  def cc(spark: SparkSession, edges: DataFrame, nOverride: Int = -1,
         maxIters: Int = 200): DataFrame = {
    val sym = edges.select(col("u").cast("long").as("a"), col("v").cast("long").as("b"))
      .union(edges.select(col("v").cast("long").as("a"), col("u").cast("long").as("b")))
      .where(col("a") =!= col("b"))
      .distinct()
      .cache()
    val verts0 = sym.select(col("a").as("v")).distinct()
    val verts =
      if (nOverride > 0)
        verts0.union(spark.range(nOverride).select(col("id").as("v"))).distinct()
      else verts0
    var labels = verts.select(col("v"), col("v").as("l")).cache()
    labels.count()
    var iter = 0
    var changed = 1L
    while (changed > 0 && iter < maxIters) {
      // candidate label per vertex: min over neighbours' labels
      val cand = sym.join(labels.withColumnRenamed("v", "b"), "b")
        .groupBy(col("a").as("v")).agg(min(col("l")).as("nl"))
      val next = labels.join(cand, Seq("v"), "left")
        .select(col("v"), least(col("l"), coalesce(col("nl"), col("l"))).as("l"))
        .localCheckpoint(true)
      changed = next.join(labels.withColumnRenamed("l", "ol"), "v")
        .where(col("l") =!= col("ol")).count()
      labels.unpersist()
      labels = next
      iter += 1
    }
    sym.unpersist()
    labels
  }

  /** Labeling as an Int array (test helper; small graphs only). */
  def ccArray(spark: SparkSession, edges: DataFrame, n: Int): Array[Int] = {
    val out = Array.tabulate(n)(identity)
    cc(spark, edges, nOverride = n).collect().foreach { r =>
      out(r.getLong(0).toInt) = r.getLong(1).toInt
    }
    out
  }
}
