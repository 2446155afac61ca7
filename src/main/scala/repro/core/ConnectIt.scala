package repro.core

import java.util.concurrent.atomic.AtomicIntegerArray
import org.apache.spark.sql.SparkSession
import repro.core.Options._
import repro.core.minbased.MinBased
import repro.core.{sampling => smp}
import repro.core.uf.{AtomicOps, UnionFind}
import repro.graph.HostGraph

/** The ConnectIt framework: Algorithm 1 (connectivity) and Algorithm 2
  * (spanning forest) — compose any sampling method with any finish
  * method; Section 3.
  */
object ConnectIt {

  /** Outcome of one connectivity / spanning-forest run. */
  final case class CCResult(
      labels: Array[Int],
      numComponents: Int,
      frequentid: Int,
      sampleSec: Double,
      finishSec: Double,
      totalSec: Double,
      forest: Array[(Int, Int)],
      /** Fraction of vertices in the most frequent sampled component. */
      coverage: Double,
      /** Fraction of edges inter-component under the sampled labeling. */
      interCompFrac: Double,
      totalPathLength: Long,
      maxPathLength: Int,
  )

  /** Algorithm 1/2. `wantForest` requires a root-based finish method. */
  def connectivity(spark: SparkSession, g: HostGraph,
                   sampling: SamplingOpt, finish: FinishOpt,
                   wantForest: Boolean = false,
                   instrument: Boolean = false,
                   sampleStats: Boolean = false): CCResult = {
    require(!wantForest || isRootBased(finish),
      s"${finish.name} is not root-based; spanning forest unsupported (3.4)")
    // SpliceAtomic moves subtrees between trees without a root hook, so
    // the edge witnessing a later hook may already be spanned — recording
    // it can put a cycle in the forest (deviation from Theorem 7's
    // sketch; see DESIGN.md). Use SplitAtomicOne / HalveAtomicOne.
    require(!wantForest || (finish match {
      case u: UnionFindOpt =>
        !((u.alg == UfRemCas || u.alg == UfRemLock) && u.splice == SpliceAtomic)
      case _ => true
    }), s"${finish.name}: spanning forest requires a non-splice compression option")
    val ctx = RunCtx.create(g.n)
    try {
      ctx.instrument = instrument
      if (wantForest) ctx.ensureForest()
      finish match {
        case u: UnionFindOpt =>
          if (u.alg == UfHooks) ctx.ensureHooks()
          if (u.alg == UfRemLock) ctx.ensureLocks()
          if (u.alg == UfJtb) ctx.ensurePrio(g.n.toLong * 7919)
        case _ => ()
      }

      // ------------------------------------------------------- sampling
      val t0 = System.nanoTime()
      var frequentid = -1
      if (sampling != NoSampling) {
        sampling match {
          case KOutSampling(k, variant, seed) =>
            smp.KOutSampling.sample(spark, g, ctx, k, variant, seed)
          case BfsSampling(c, seed) =>
            smp.BfsSampling.sample(spark, g, ctx, c, seed)
          case LddSampling(beta, permute, seed) =>
            smp.LddSampling.sample(spark, g, ctx, beta, permute, seed)
          case NoSampling => ()
        }
        normalizeSampled(spark, ctx)
        // parallel post-sampling snapshot + frequent-label identification
        ctx.allocSampled()
        val cid = ctx.id
        val nc = Par.defaultChunks(spark)
        Par.maybeJobs(spark, g.n.toLong, nc) { c =>
          val cx = RunCtx.lookup(cid)
          val (lo, hi) = Par.range(cx.n, nc, c)
          cx.snapshotRange(lo, hi)
        }
        frequentid = identifyFrequentPar(spark, ctx)
      }
      val t1 = System.nanoTime()

      // --------------------------------------------------------- finish
      finish match {
        case u: UnionFindOpt =>
          runUnionFindFinish(spark, g, ctx, u, frequentid)
        case lt: LiuTarjanOpt =>
          MinBased.runLiuTarjan(spark, g, ctx, lt, frequentid, wantForest)
        case StergiouOpt =>
          MinBased.runStergiou(spark, g, ctx, frequentid)
        case ShiloachVishkinOpt =>
          MinBased.runShiloachVishkin(spark, g, ctx, frequentid, wantForest)
        case LabelPropOpt =>
          MinBased.runLabelProp(spark, g, ctx, frequentid)
      }
      val t2 = System.nanoTime()

      val labels = ctx.resolveLabels(sentinelRoot = frequentid)
      val nComp = repro.graph.Reference.numComponents(labels)
      val (cov, ic) =
        if (sampleStats && sampling != NoSampling) samplingQuality(spark, g, ctx, frequentid)
        else (0.0, 0.0)
      CCResult(
        labels, nComp, frequentid,
        sampleSec = (t1 - t0) / 1e9,
        finishSec = (t2 - t1) / 1e9,
        totalSec = (t2 - t0) / 1e9,
        forest = if (wantForest) ctx.forestEdges else Array.empty,
        coverage = cov, interCompFrac = ic,
        totalPathLength = ctx.totalPathLength.sum(),
        maxPathLength = ctx.maxPathLength.get(),
      )
    } finally ctx.unregister()
  }

  /** Spanning forest (Algorithm 2): connectivity with forest recording. */
  def spanningForest(spark: SparkSession, g: HostGraph,
                     sampling: SamplingOpt, finish: FinishOpt): CCResult =
    connectivity(spark, g, sampling, finish, wantForest = true)

  // ------------------------------------------------------- normalization
  /** Remap every sampled cluster's label to its minimum member, so the
    * labeling is height-1 trees rooted at minima (restores the
    * parent(x) <= x invariant the asynchronous finish methods need, see
    * DESIGN.md) and relocate forest slots so new roots have empty slots.
    */
  def normalizeSampled(spark: SparkSession, ctx: RunCtx): Unit = {
    val n = ctx.n
    val minRep = new AtomicIntegerArray(n)
    ctx.aux.put("minrep", minRep)
    val cid = ctx.id
    val nc = Par.defaultChunks(spark)
    Par.maybeJobs(spark, n.toLong, nc) { c =>
      val cx = RunCtx.lookup(cid)
      val mr = cx.aux.get("minrep").asInstanceOf[AtomicIntegerArray]
      val (lo, hi) = Par.range(cx.n, nc, c)
      var v = lo
      while (v < hi) { mr.set(v, Int.MaxValue); v += 1 }
    }
    Par.maybeJobs(spark, n.toLong, nc) { c =>
      val cx = RunCtx.lookup(cid)
      val mr = cx.aux.get("minrep").asInstanceOf[AtomicIntegerArray]
      val (lo, hi) = Par.range(cx.n, nc, c)
      var v = lo
      while (v < hi) {
        AtomicOps.writeMin(mr, cx.parents.get(v), v)
        v += 1
      }
    }
    Par.maybeJobs(spark, n.toLong, nc) { c =>
      val cx = RunCtx.lookup(cid)
      val mr = cx.aux.get("minrep").asInstanceOf[AtomicIntegerArray]
      val (lo, hi) = Par.range(cx.n, nc, c)
      var v = lo
      while (v < hi) {
        cx.parents.set(v, mr.get(cx.parents.get(v)))
        v += 1
      }
    }
    // forest slot fix-up: old root l's cluster is now rooted at r; r's
    // slot must be empty for the finish phase (Definition B.2 (3)).
    if (ctx.forest != null) {
      var l = 0
      while (l < n) {
        val r = minRep.get(l)
        if (r != Int.MaxValue && r != l) {
          ctx.forest.set(l, ctx.forest.get(r))
          ctx.forest.set(r, -1L)
        }
        l += 1
      }
    }
    ctx.aux.remove("minrep")
  }

  /** Most frequent label (Algorithm 1 line 6). Returns -1 when sampling
    * produced only singletons (no skip benefit).
    */
  def identifyFrequent(labels: Array[Int]): Int = {
    val n = labels.length
    val counts = new Array[Int](n)
    var i = 0
    while (i < n) { counts(labels(i)) += 1; i += 1 }
    var best = -1; var bestC = 1
    i = 0
    while (i < n) {
      if (counts(i) > bestC) { best = i; bestC = counts(i) }
      i += 1
    }
    best
  }

  /** Parallel frequent-label identification for large n: argmax over a
    * fixed-size vertex sample (the frequent component the two-phase
    * optimization targets holds >10% of vertices, so a 64k sample finds
    * its label with overwhelming probability), then an exact parallel
    * count of that single candidate.
    */
  def identifyFrequentPar(spark: SparkSession, ctx: RunCtx): Int = {
    val labels = ctx.sampled
    val n = labels.length
    if (n <= 65536) return identifyFrequent(labels)
    val sample = 65536
    val counts = new java.util.HashMap[Integer, Integer]()
    var i = 0
    while (i < sample) {
      val v = ((repro.graph.GraphGen.mix(0x5eed + i) >>> 1) % n).toInt
      counts.merge(labels(v), 1, (a, b) => a + b)
      i += 1
    }
    var best = -1; var bestC = 1
    counts.forEach((l, c) => if (c > bestC) { best = l; bestC = c })
    if (best < 0) return -1
    // exact count of the candidate
    val acc = spark.sparkContext.longAccumulator("freq-count")
    val cid = ctx.id
    val nc = Par.defaultChunks(spark)
    val cand = best
    Par.jobs(spark, nc) { c =>
      val cx = RunCtx.lookup(cid)
      val s = cx.sampled
      val (lo, hi) = Par.range(cx.n, nc, c)
      var cnt = 0L
      var v = lo
      while (v < hi) { if (s(v) == cand) cnt += 1; v += 1 }
      acc.add(cnt)
    }
    if (acc.value >= 2L) best else -1
  }

  // --------------------------------------------------- union-find finish
  /** Finish phase for the union-find family: without sampling, an
    * edge-parallel pass over the chunked edge list; with sampling, a
    * vertex-parallel CSR pass that skips vertices in the frequent
    * component (their cross edges are applied from the other endpoint —
    * Theorem 3).
    */
  private def runUnionFindFinish(spark: SparkSession, g: HostGraph, ctx: RunCtx,
                                 opt: UnionFindOpt, frequentid: Int): Unit = {
    val gid = g.id
    val cid = ctx.id
    if (frequentid < 0) {
      val nChunks = g.chunks.length
      Par.jobs(spark, nChunks) { i =>
        val gr = HostGraph.lookup(gid)
        val cx = RunCtx.lookup(cid)
        val arr = gr.chunks(i)
        var j = 0
        while (j < arr.length) {
          val e = arr(j)
          UnionFind.union(cx, opt, (e >>> 32).toInt, (e & 0xffffffffL).toInt)
          j += 1
        }
      }
    } else {
      val nChunks = Par.defaultChunks(spark)
      Par.jobs(spark, nChunks) { i =>
        val gr = HostGraph.lookup(gid)
        val cx = RunCtx.lookup(cid)
        val s = cx.sampled
        val (lo, hi) = Par.range(gr.n, nChunks, i)
        var v = lo
        while (v < hi) {
          if (s(v) != frequentid) {
            val off = gr.offsets(v); val end = gr.offsets(v + 1)
            var j = off
            while (j < end) {
              UnionFind.union(cx, opt, v, gr.targets(j))
              j += 1
            }
          }
          v += 1
        }
      }
    }
  }

  // ------------------------------------------------------ sampling stats
  /** (coverage, inter-component edge fraction) of the sampled labeling —
    * the quantities of Tables 6 and 7.
    */
  def samplingQuality(spark: SparkSession, g: HostGraph, ctx: RunCtx,
                      frequentid: Int): (Double, Double) = {
    val s = ctx.sampled
    if (s == null) return (0.0, 0.0)
    var freqCount = 0L
    var i = 0
    while (i < s.length) { if (s(i) == frequentid) freqCount += 1; i += 1 }
    var inter = 0L
    g.chunks.foreach { arr =>
      var j = 0
      while (j < arr.length) {
        val e = arr(j)
        if (s((e >>> 32).toInt) != s((e & 0xffffffffL).toInt)) inter += 1
        j += 1
      }
    }
    (freqCount.toDouble / g.n, inter.toDouble / math.max(1L, g.m))
  }
}
