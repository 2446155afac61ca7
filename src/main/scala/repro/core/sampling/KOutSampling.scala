package repro.core.sampling

import org.apache.spark.sql.SparkSession
import repro.core.{Par, RunCtx}
import repro.core.Options._
import repro.core.uf.{AtomicOps, UnionFind}
import repro.graph.{GraphGen, HostGraph}

/** k-out sampling (Algorithm 4, Appendix C.3 variants).
  *
  * Selects up to k edges out of each vertex (per the chosen variant),
  * contracts them with a concurrent union-find (UF-Rem-CAS with
  * SplitAtomicOne — the paper's workhorse), then fully compresses the
  * parents array so the emitted labeling is a set of height-1 trees
  * rooted at component minima (Definition 3.1 requirement (1)).
  */
object KOutSampling {

  def sample(spark: SparkSession, g: HostGraph, ctx: RunCtx,
             k: Int, variant: KOutVariant, seed: Long): Unit = {
    val nChunks = Par.defaultChunks(spark)
    val gid = g.id
    val cid = ctx.id
    val opt = UnionFindOpt(UfRemCas, FindNaive, SplitAtomicOne)
    Par.jobs(spark, nChunks) { i =>
      val gr = HostGraph.lookup(gid)
      val cx = RunCtx.lookup(cid)
      val (lo, hi) = Par.range(gr.n, nChunks, i)
      var v = lo
      while (v < hi) {
        val off = gr.offsets(v)
        val deg = gr.offsets(v + 1) - off
        if (deg > 0) {
          variant match {
            case KOutAfforest =>
              var j = 0
              while (j < k && j < deg) {
                UnionFind.union(cx, opt, v, gr.targets(off + j)); j += 1
              }
            case KOutPure =>
              var j = 0
              while (j < k) {
                val t = gr.targets(off + ((GraphGen.mix(seed ^ GraphGen.mix(v.toLong * 131 + j)) >>> 1) % deg).toInt)
                UnionFind.union(cx, opt, v, t); j += 1
              }
            case KOutHybrid =>
              UnionFind.union(cx, opt, v, gr.targets(off))
              var j = 1
              while (j < k) {
                val t = gr.targets(off + ((GraphGen.mix(seed ^ GraphGen.mix(v.toLong * 131 + j)) >>> 1) % deg).toInt)
                UnionFind.union(cx, opt, v, t); j += 1
              }
            case KOutMaxDeg =>
              // reduce over all neighbours for the max-degree endpoint
              var best = gr.targets(off); var bestDeg = -1
              var j = 0
              while (j < deg) {
                val t = gr.targets(off + j)
                val d = gr.offsets(t + 1) - gr.offsets(t)
                if (d > bestDeg) { bestDeg = d; best = t }
                j += 1
              }
              UnionFind.union(cx, opt, v, best)
              j = 1
              while (j < k) {
                val t = gr.targets(off + ((GraphGen.mix(seed ^ GraphGen.mix(v.toLong * 131 + j)) >>> 1) % deg).toInt)
                UnionFind.union(cx, opt, v, t); j += 1
              }
          }
        }
        v += 1
      }
    }
    // Fully compress the components array, in parallel (Alg 4 line 4).
    Par.jobs(spark, nChunks) { i =>
      val cx = RunCtx.lookup(cid)
      val (lo, hi) = Par.range(cx.n, nChunks, i)
      var v = lo
      while (v < hi) {
        val r = AtomicOps.findNaive(cx, v)
        cx.parents.set(v, r)
        v += 1
      }
    }
  }
}
