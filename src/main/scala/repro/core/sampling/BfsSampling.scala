package repro.core.sampling

import java.util.concurrent.atomic.AtomicInteger
import org.apache.spark.sql.SparkSession
import repro.core.{Par, RunCtx}
import repro.graph.{GraphGen, HostGraph}

/** Shared frontier state for level-synchronous traversals (BFS, LDD,
  * Label-Propagation). Lives in a RunCtx's aux map; tasks reach it via
  * SharedState, never through closures.
  */
final class Frontier(val n: Int) {
  var cur: Array[Int] = new Array[Int](0)
  var size: Int = 0
  val next: Array[Int] = new Array[Int](n)
  val nextCnt = new AtomicInteger(0)

  /** Reserve `len` slots in the next frontier and copy `buf` into them. */
  def publish(buf: Array[Int], len: Int): Unit = {
    if (len > 0) {
      val off = nextCnt.getAndAdd(len)
      System.arraycopy(buf, 0, next, off, len)
    }
  }

  /** Swap next into cur; returns new frontier size. */
  def advance(): Int = {
    size = nextCnt.get()
    System.arraycopy(next, 0, cur2(size), 0, size)
    nextCnt.set(0)
    size
  }
  private def cur2(sz: Int): Array[Int] = {
    if (cur.length < sz) cur = new Array[Int](math.max(sz, 16))
    cur
  }
}

/** Breadth-first-search sampling (Algorithm 5) with the
  * direction-optimization of Beamer et al. [11]: dense frontiers switch
  * to a bottom-up round where unvisited vertices probe their neighbours.
  *
  * Each try labels the vertices reached from a random source with the
  * source id; a try is kept if it covers > 10% of the vertices,
  * otherwise the labeling is reset and (up to c times) retried.
  */
object BfsSampling {
  private[repro] val FKey = "bfs-frontier"

  /** Run sampling; returns true iff a big component was found. */
  def sample(spark: SparkSession, g: HostGraph, ctx: RunCtx,
             c: Int, seed: Long): Boolean = {
    val n = g.n
    val f = new Frontier(n)
    ctx.aux.put(FKey, f)
    try {
      var t = 0
      while (t < c) {
        // pick a random source, preferring one with nonzero degree
        var src = -1
        var probe = 0
        while (src < 0 && probe < 100) {
          val cand = ((GraphGen.mix(seed + t * 1000 + probe) >>> 1) % n).toInt
          if (g.degree(cand) > 0) src = cand
          probe += 1
        }
        if (src < 0) src = 0
        val covered = bfs(spark, g, ctx, src)
        if (covered > n / 10) return true
        reset(spark, ctx)
        t += 1
      }
      false
    } finally ctx.aux.remove(FKey)
  }

  /** One full BFS from src, claiming vertices via CAS on the parents
    * array (parents(v): v -> src). Returns the number of vertices
    * covered (including src). Records forest tree edges if enabled.
    */
  def bfs(spark: SparkSession, g: HostGraph, ctx: RunCtx, src: Int): Int = {
    val n = g.n
    val f = ctx.aux.get(FKey).asInstanceOf[Frontier]
    f.cur = Array(src)
    f.size = 1
    var covered = 1
    val gid = g.id
    val cid = ctx.id
    val nChunks = Par.defaultChunks(spark)
    while (f.size > 0) {
      val bottomUp = f.size > n / 20
      if (bottomUp) {
        Par.maybeJobs(spark, n.toLong, nChunks) { i =>
          val gr = HostGraph.lookup(gid)
          val cx = RunCtx.lookup(cid)
          val fr = cx.aux.get(FKey).asInstanceOf[Frontier]
          val (lo, hi) = Par.range(gr.n, nChunks, i)
          val buf = new Array[Int](hi - lo)
          var len = 0
          var v = lo
          while (v < hi) {
            if (cx.parents.get(v) == v && v != src) {
              // probe neighbours for a visited one
              val off = gr.offsets(v); val end = gr.offsets(v + 1)
              var j = off
              var done = false
              while (j < end && !done) {
                val w = gr.targets(j)
                if (w == src || cx.parents.get(w) == src) {
                  cx.parents.set(v, src)
                  val fo = cx.forest
                  if (fo != null) fo.set(v, (w.toLong << 32) | (v.toLong & 0xffffffffL))
                  buf(len) = v; len += 1
                  done = true
                }
                j += 1
              }
            }
            v += 1
          }
          fr.publish(buf, len)
        }
      } else {
        val fsz = f.size
        val work = estimateWork(g, f)
        Par.maybeJobs(spark, work, nChunks) { i =>
          val gr = HostGraph.lookup(gid)
          val cx = RunCtx.lookup(cid)
          val fr = cx.aux.get(FKey).asInstanceOf[Frontier]
          val (lo, hi) = Par.range(fsz, nChunks, i)
          var buf = new Array[Int](256)
          var len = 0
          var fi = lo
          while (fi < hi) {
            val v = fr.cur(fi)
            val off = gr.offsets(v); val end = gr.offsets(v + 1)
            var j = off
            while (j < end) {
              val w = gr.targets(j)
              if (w != src && cx.parents.compareAndSet(w, w, src)) {
                val fo = cx.forest
                if (fo != null) fo.set(w, (v.toLong << 32) | (w.toLong & 0xffffffffL))
                if (len == buf.length) buf = java.util.Arrays.copyOf(buf, len * 2)
                buf(len) = w; len += 1
              }
              j += 1
            }
            fi += 1
          }
          fr.publish(buf, len)
        }
      }
      covered += f.advance()
    }
    covered
  }

  private def estimateWork(g: HostGraph, f: Frontier): Long = {
    // sample a few frontier degrees to estimate round work
    var s = 0L
    val step = math.max(1, f.size / 16)
    var i = 0
    while (i < f.size) { s += g.degree(f.cur(i)); i += step }
    s * step + f.size
  }

  /** Reset labels (and forest slots) to pristine state (failed try). */
  def reset(spark: SparkSession, ctx: RunCtx): Unit = {
    val cid = ctx.id
    val nc = Par.defaultChunks(spark)
    Par.maybeJobs(spark, ctx.n.toLong, nc) { i =>
      val cx = RunCtx.lookup(cid)
      val (lo, hi) = Par.range(cx.n, nc, i)
      var v = lo
      while (v < hi) {
        cx.parents.set(v, v)
        val fo = cx.forest
        if (fo != null) fo.set(v, -1L)
        v += 1
      }
    }
  }
}
