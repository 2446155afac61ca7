package repro.apps

import org.apache.spark.sql.SparkSession
import repro.core.{Par, RunCtx}
import repro.core.Options._
import repro.core.uf.{AtomicOps, UnionFind}
import repro.graph.HostGraph

/** Index-based SCAN clustering (Section 5.2, GS*-Index / GS*-Query).
  *
  * The index stores the structural similarity of every (directed) CSR
  * slot: sigma(u,v) = |N[u] ∩ N[v]| / sqrt(|N[u]| |N[v]|) with closed
  * neighbourhoods. A (eps, mu) query finds core vertices (>= mu
  * eps-similar neighbours), clusters cores over eps-similar core-core
  * edges, and attaches non-core border vertices to the minimum adjacent
  * core cluster. GS*-Query runs this sequentially; the ConnectIt version
  * parallelizes the core clustering with UF-Rem-CAS (SplitAtomicOne,
  * FindNaive).
  */
object Scan {

  /** sim(i) = similarity of CSR slot i (edge offsets(u) <= i < offsets(u+1)). */
  final case class Index(sim: Array[Double])

  /** Build the similarity index with a parallel merge-intersection over
    * the sorted CSR adjacency (the GS*-Index construction step).
    */
  def buildIndex(spark: SparkSession, g: HostGraph): Index = {
    val sim = new Array[Double](g.targets.length)
    val gid = g.id
    repro.graph.SharedState.put(s"scan-sim:${g.id}", sim)
    val nChunks = Par.defaultChunks(spark)
    Par.maybeJobs(spark, g.targets.length.toLong, nChunks) { i =>
      val gr = HostGraph.lookup(gid)
      val sm = repro.graph.SharedState.get[Array[Double]](s"scan-sim:$gid")
      val (lo, hi) = Par.range(gr.n, nChunks, i)
      var u = lo
      while (u < hi) {
        val du = gr.degree(u)
        val uo = gr.offsets(u)
        var s = uo
        val ue = gr.offsets(u + 1)
        while (s < ue) {
          val v = gr.targets(s)
          // merge-intersect adjacency lists of u and v (both sorted)
          var a = uo; var b = gr.offsets(v)
          val ae = ue; val be = gr.offsets(v + 1)
          var common = 0
          while (a < ae && b < be) {
            val x = gr.targets(a); val y = gr.targets(b)
            if (x == y) { common += 1; a += 1; b += 1 }
            else if (x < y) a += 1
            else b += 1
          }
          val dv = gr.degree(v)
          // closed neighbourhoods: u and v are in each other's N[]
          sm(s) = (common + 2).toDouble / math.sqrt((du + 1).toDouble * (dv + 1))
          s += 1
        }
        u += 1
      }
    }
    repro.graph.SharedState.remove(s"scan-sim:${g.id}")
    Index(sim)
  }

  /** Core flags for a (eps, mu) query. */
  def cores(g: HostGraph, idx: Index, eps: Double, mu: Int): Array[Boolean] = {
    val out = new Array[Boolean](g.n)
    var u = 0
    while (u < g.n) {
      var cnt = 0
      var s = g.offsets(u)
      val e = g.offsets(u + 1)
      while (s < e) { if (idx.sim(s) >= eps) cnt += 1; s += 1 }
      out(u) = cnt >= mu
      u += 1
    }
    out
  }

  /** Sequential GS*-Query: labels(v) = min core id of v's cluster, or -1
    * if v is in no cluster.
    */
  def querySeq(g: HostGraph, idx: Index, eps: Double, mu: Int): Array[Int] = {
    val core = cores(g, idx, eps, mu)
    val labels = Array.fill(g.n)(-1)
    // cluster cores by BFS over eps-similar core-core edges
    var u = 0
    val stack = new java.util.ArrayDeque[Integer]()
    while (u < g.n) {
      if (core(u) && labels(u) == -1) {
        // collect the whole cluster, then label with its min id
        val memb = scala.collection.mutable.ArrayBuffer[Int]()
        stack.push(u); labels(u) = u
        var minId = u
        while (!stack.isEmpty) {
          val x = stack.pop().intValue()
          memb += x
          if (x < minId) minId = x
          var s = g.offsets(x)
          val e = g.offsets(x + 1)
          while (s < e) {
            val w = g.targets(s)
            if (idx.sim(s) >= eps && core(w) && labels(w) == -1) {
              labels(w) = u; stack.push(w)
            }
            s += 1
          }
        }
        memb.foreach(x => labels(x) = minId)
      }
      u += 1
    }
    attachBorders(g, idx, eps, core, labels)
    labels
  }

  /** ConnectIt-parallelized GS*-Query: cluster cores with a concurrent
    * union-find driven by Spark tasks.
    */
  def queryPar(spark: SparkSession, g: HostGraph, idx: Index,
               eps: Double, mu: Int): Array[Int] = {
    val core = cores(g, idx, eps, mu)
    val ctx = RunCtx.create(g.n)
    try {
      val gid = g.id
      val cid = ctx.id
      repro.graph.SharedState.put(s"scan-q:$cid", (idx.sim, core))
      val nChunks = Par.defaultChunks(spark)
      val opt = UnionFindOpt(UfRemCas, FindNaive, SplitAtomicOne)
      Par.maybeJobs(spark, g.targets.length.toLong, nChunks) { i =>
        val gr = HostGraph.lookup(gid)
        val cx = RunCtx.lookup(cid)
        val (sm, co) = repro.graph.SharedState.get[(Array[Double], Array[Boolean])](s"scan-q:$cid")
        val (lo, hi) = Par.range(gr.n, nChunks, i)
        var u = lo
        while (u < hi) {
          if (co(u)) {
            var s = gr.offsets(u)
            val e = gr.offsets(u + 1)
            while (s < e) {
              val w = gr.targets(s)
              if (sm(s) >= eps && co(w)) UnionFind.union(cx, opt, u, w)
              s += 1
            }
          }
          u += 1
        }
      }
      repro.graph.SharedState.remove(s"scan-q:$cid")
      val resolved = ctx.resolveLabels()
      val labels = Array.fill(g.n)(-1)
      var v = 0
      while (v < g.n) { if (core(v)) labels(v) = resolved(v); v += 1 }
      attachBorders(g, idx, eps, core, labels)
      labels
    } finally ctx.unregister()
  }

  /** Attach non-core vertices to the minimum adjacent eps-similar core
    * cluster (deterministic border rule so seq and par agree).
    */
  private def attachBorders(g: HostGraph, idx: Index, eps: Double,
                            core: Array[Boolean], labels: Array[Int]): Unit = {
    var v = 0
    while (v < g.n) {
      if (!core(v)) {
        var best = -1
        var s = g.offsets(v)
        val e = g.offsets(v + 1)
        while (s < e) {
          val w = g.targets(s)
          if (idx.sim(s) >= eps && core(w)) {
            val l = labels(w)
            if (best == -1 || l < best) best = l
          }
          s += 1
        }
        labels(v) = best
      }
      v += 1
    }
  }
}
