package repro.core.sampling

import java.util.concurrent.atomic.{AtomicInteger, AtomicIntegerArray}
import org.apache.spark.sql.SparkSession
import repro.core.{Par, RunCtx}
import repro.graph.{GraphGen, HostGraph}

/** Low-diameter decomposition sampling (Algorithm 6): one round of the
  * Miller–Peng–Xu decomposition with parameter beta.
  *
  * Every vertex draws a shift delta_v ~ Exp(beta); at (integer) time
  * floor(delta_v) an unclaimed vertex starts its own cluster, and all
  * cluster frontiers expand one BFS hop per time step, claiming unclaimed
  * vertices. The result is a clustering where each cluster has strong
  * diameter O(log n / beta) and ~beta*m edges are cut in expectation.
  * The emitted labeling maps each vertex to its cluster center
  * (height-1 trees; normalization to cluster minima happens in
  * ConnectIt.normalizeSampled).
  */
object LddSampling {
  private val FKey = "ldd-frontier"

  def sample(spark: SparkSession, g: HostGraph, ctx: RunCtx,
             beta: Double, permute: Boolean, seed: Long): Unit = {
    val n = g.n
    // Bucket vertices by integer start time. The exponential tail is
    // capped; anything beyond the cap starts at the cap round.
    // MPX start times: s_v = delta_max - delta_v with delta_v ~ Exp(beta)
    // — the few vertices with the LARGEST shifts wake up first and their
    // clusters claim almost everything before the rest start.
    val shifts = new Array[Double](n)
    var dmax = 0.0
    var v = 0
    while (v < n) {
      val key = if (permute) (GraphGen.mix(seed ^ (v * 0x9E3779B9L)) >>> 1) else v.toLong
      val u = GraphGen.u01(seed, key, 77)
      val s = -math.log(1.0 - u) / beta
      shifts(v) = s
      if (s > dmax) dmax = s
      v += 1
    }
    val maxBucket = math.max(4, dmax.toInt + 1)
    val byRound = Array.fill(maxBucket + 1)(new scala.collection.mutable.ArrayBuffer[Int]())
    v = 0
    while (v < n) {
      val start = dmax - shifts(v)
      byRound(math.min(maxBucket, start.toInt)) += v
      v += 1
    }

    val claimed = new AtomicIntegerArray(n)
    val claimedCount = new AtomicInteger(0)
    val f = new Frontier(n)
    ctx.aux.put(FKey, f)
    ctx.aux.put("ldd-claimed", claimed)
    val gid = g.id
    val cid = ctx.id
    val nChunks = Par.defaultChunks(spark)
    try {
      var t = 0
      f.size = 0
      while (claimedCount.get() < n || f.size > 0) {
        // (1) wake up this round's centers (driver side: bucket append)
        if (t <= maxBucket) {
          val bucket = byRound(t)
          var bi = 0
          while (bi < bucket.length) {
            val c = bucket(bi)
            if (claimed.compareAndSet(c, 0, 1)) {
              // center: label already == self
              if (f.cur.length < f.size + 1)
                f.cur = java.util.Arrays.copyOf(f.cur, math.max(16, 2 * (f.size + 1)))
              f.cur(f.size) = c; f.size += 1
              claimedCount.incrementAndGet()
            }
            bi += 1
          }
        }
        // (2) expand all cluster frontiers one hop
        val fsz = f.size
        if (fsz > 0) {
          Par.maybeJobs(spark, fsz.toLong * 8, nChunks) { i =>
            val gr = HostGraph.lookup(gid)
            val cx = RunCtx.lookup(cid)
            val fr = cx.aux.get(FKey).asInstanceOf[Frontier]
            val cl = cx.aux.get("ldd-claimed").asInstanceOf[AtomicIntegerArray]
            val (lo, hi) = Par.range(fsz, nChunks, i)
            var buf = new Array[Int](256)
            var len = 0
            var fi = lo
            while (fi < hi) {
              val u = fr.cur(fi)
              val lab = cx.parents.get(u)
              val off = gr.offsets(u); val end = gr.offsets(u + 1)
              var j = off
              while (j < end) {
                val w = gr.targets(j)
                if (cl.get(w) == 0 && cl.compareAndSet(w, 0, 1)) {
                  cx.parents.set(w, lab)
                  val fo = cx.forest
                  if (fo != null) fo.set(w, (u.toLong << 32) | (w.toLong & 0xffffffffL))
                  if (len == buf.length) buf = java.util.Arrays.copyOf(buf, len * 2)
                  buf(len) = w; len += 1
                }
                j += 1
              }
              fi += 1
            }
            fr.publish(buf, len)
          }
          claimedCount.addAndGet(f.nextCnt.get())
        }
        f.advance()
        t += 1
      }
    } finally {
      ctx.aux.remove(FKey)
      ctx.aux.remove("ldd-claimed")
    }
  }
}
