package repro.core

import org.apache.spark.sql.SparkSession

/** Spark-side parallel-for: the execution substrate for all kernels.
  *
  * A call to [[jobs]] runs one Spark job whose tasks are the paper's
  * "threads"; the job boundary is the synchronization barrier between
  * rounds of round-synchronous algorithms. Closures passed here must
  * capture only small serializable values (ids, options) — shared arrays
  * are reached through [[repro.graph.SharedState]].
  */
object Par {
  /** Below this estimated work a "round" runs inline on the driver
    * thread instead of paying a Spark job launch — the same granularity
    * control any parallel-for runtime applies (a tiny BFS frontier is not
    * worth a fork-join). Semantics are identical.
    */
  val GrainSize: Long = 65536L

  def jobs(spark: SparkSession, nChunks: Int)(f: Int => Unit): Unit =
    spark.sparkContext.parallelize(0 until nChunks, nChunks).foreach(f)

  /** Run chunks as a Spark job if `work` is above the grain size, else
    * inline sequentially on the driver.
    */
  def maybeJobs(spark: SparkSession, work: Long, nChunks: Int)(f: Int => Unit): Unit =
    if (work >= GrainSize) jobs(spark, nChunks)(f)
    else { var i = 0; while (i < nChunks) { f(i); i += 1 } }

  /** Default kernel fan-out: 2 tasks per core. */
  def defaultChunks(spark: SparkSession): Int =
    math.max(1, 2 * spark.sparkContext.defaultParallelism)

  /** Split [0, n) into nChunks ranges; returns (lo, hi) for chunk i. */
  def range(n: Int, nChunks: Int, i: Int): (Int, Int) = {
    val per = (n + nChunks - 1) / nChunks
    val lo = math.min(n, i * per)
    (lo, math.min(n, lo + per))
  }
}
