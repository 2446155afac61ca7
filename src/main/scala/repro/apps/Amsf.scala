package repro.apps

import java.util.concurrent.atomic.AtomicLongArray
import org.apache.spark.sql.SparkSession
import repro.core.{Par, RunCtx}
import repro.core.Options._
import repro.core.uf.UnionFind
import repro.graph.{GraphGen, HostGraph}

/** Approximate minimum spanning forest (Section 5.1).
  *
  * Edges are bucketed geometrically by weight ([(1+eps)^i W_min,
  * (1+eps)^{i+1} W_min)); buckets are processed smallest-first, and
  * within a bucket edges are applied with UF-Rem-CAS (SplitAtomicOne,
  * FindNaive); every successful union contributes its edge to the
  * approximate forest. Variants:
  *  - EA: flatten all edges into one weight-sorted array, buckets are
  *    ranges of that array;
  *  - F:  per bucket, scan the remaining (alive) edges, applying and
  *    removing this bucket's edges (filtering);
  *  - NF: per bucket, re-scan all edges (no filtering);
  *  - NF-S: NF plus the ConnectIt sampling trick — per bucket, identify
  *    the current largest component L_max and skip edges internal to it.
  * The exact baseline is Borůvka (GBBS-MSF's algorithm).
  */
object Amsf {
  sealed trait Variant { def name: String }
  case object EA extends Variant { val name = "AMSF-EA" }
  case object F extends Variant { val name = "AMSF-F" }
  case object NF extends Variant { val name = "AMSF-NF" }
  case object NFS extends Variant { val name = "AMSF-NF-S" }

  final case class Result(weight: Double, nEdges: Int, sec: Double)

  private val ufOpt = UnionFindOpt(UfRemCas, FindNaive, SplitAtomicOne)

  /** Exponentially-distributed weights, one per undirected edge, laid
    * out parallel to g.chunks (deterministic in seed).
    */
  def expWeights(g: HostGraph, seed: Long): Array[Array[Double]] =
    g.chunks.map(_.map(e => -math.log(1.0 - GraphGen.u01(seed, e, 13)) + 1e-9))

  /** Flattened (packedEdge, weight) pairs sorted by weight. */
  private def flatSorted(g: HostGraph, w: Array[Array[Double]]): (Array[Long], Array[Double]) = {
    val m = g.chunks.iterator.map(_.length).sum
    val es = new Array[Long](m); val ws = new Array[Double](m)
    var k = 0
    var c = 0
    while (c < g.chunks.length) {
      val arr = g.chunks(c); val warr = w(c)
      var j = 0
      while (j < arr.length) { es(k) = arr(j); ws(k) = warr(j); k += 1; j += 1 }
      c += 1
    }
    val idx = es.indices.toArray.sortBy(ws)
    (idx.map(es), idx.map(ws))
  }

  def run(spark: SparkSession, g: HostGraph, w: Array[Array[Double]],
          eps: Double, variant: Variant): Result = {
    val t0 = System.nanoTime()
    val ctx = RunCtx.create(g.n)
    ctx.ensureForest()
    try {
      var wmin = Double.MaxValue; var wmax = 0.0
      w.foreach(_.foreach { x => if (x < wmin) wmin = x; if (x > wmax) wmax = x })
      if (wmax <= 0) return Result(0, 0, 0)
      val nBuckets = math.max(1,
        (math.log(wmax / wmin) / math.log1p(eps)).toInt + 1)
      val cid = ctx.id
      val nChunks = g.chunks.length

      variant match {
        case EA =>
          val (es, ws) = flatSorted(g, w)
          ctx.aux.put("amsf-es", es)
          var b = 0
          var lo = 0
          while (b < nBuckets && lo < es.length) {
            val hiW = if (b == nBuckets - 1) Double.MaxValue
                      else wmin * math.pow(1 + eps, b + 1)
            var hi = lo
            while (hi < es.length && ws(hi) < hiW) hi += 1
            if (hi > lo) {
              val l = lo; val h = hi
              Par.maybeJobs(spark, (h - l).toLong, nChunks) { i =>
                val cx = RunCtx.lookup(cid)
                val arr = cx.aux.get("amsf-es").asInstanceOf[Array[Long]]
                val (a, z) = Par.range(h - l, nChunks, i)
                var j = l + a
                val end = l + z
                while (j < end) {
                  val e = arr(j)
                  UnionFind.union(cx, ufOpt, (e >>> 32).toInt, (e & 0xffffffffL).toInt)
                  j += 1
                }
              }
            }
            lo = hi
            b += 1
          }
          ctx.aux.remove("amsf-es")

        case F | NF | NFS =>
          // alive edge store (F compacts it; NF/NF-S leave it whole)
          val store = g.chunks.map(a => java.util.Arrays.copyOf(a, a.length))
          val wstore = w.map(a => java.util.Arrays.copyOf(a, a.length))
          val alive = store.map(_.length)
          ctx.aux.put("amsf-store", store)
          ctx.aux.put("amsf-w", wstore)
          ctx.aux.put("amsf-alive", alive)
          var b = 0
          while (b < nBuckets) {
            val loW = wmin * math.pow(1 + eps, b) - (if (b == 0) 1e-12 else 0)
            val hiW = if (b == nBuckets - 1) Double.MaxValue
                      else wmin * math.pow(1 + eps, b + 1)
            // NF-S: identify the current largest component
            var freq = -1
            if (variant == NFS) {
              val labels = ctx.resolveLabels()
              freq = repro.core.ConnectIt.identifyFrequent(labels)
              ctx.aux.put("amsf-labels", labels)
            }
            val fr = freq
            val filt = variant == F
            Par.maybeJobs(spark, g.m, nChunks) { i =>
              val cx = RunCtx.lookup(cid)
              val st = cx.aux.get("amsf-store").asInstanceOf[Array[Array[Long]]]
              val wt = cx.aux.get("amsf-w").asInstanceOf[Array[Array[Double]]]
              val al = cx.aux.get("amsf-alive").asInstanceOf[Array[Int]]
              val lab = if (fr >= 0) cx.aux.get("amsf-labels").asInstanceOf[Array[Int]] else null
              val arr = st(i); val warr = wt(i)
              val lim = al(i)
              var j = 0
              var keep = 0
              while (j < lim) {
                val e = arr(j); val x = warr(j)
                val inBucket = x >= loW && x < hiW
                if (inBucket) {
                  val u = (e >>> 32).toInt; val v = (e & 0xffffffffL).toInt
                  // NF-S: skip only edges internal to L_max
                  if (fr < 0 || !(lab(u) == fr && lab(v) == fr))
                    UnionFind.union(cx, ufOpt, u, v)
                } else if (filt) {
                  arr(keep) = e; warr(keep) = x; keep += 1
                }
                if (!filt) keep = j + 1
                j += 1
              }
              if (filt) al(i) = keep
            }
            if (variant == NFS) ctx.aux.remove("amsf-labels")
            b += 1
          }
          ctx.aux.remove("amsf-store"); ctx.aux.remove("amsf-w"); ctx.aux.remove("amsf-alive")
      }

      val (wsum, cnt) = forestWeight(g, w, ctx)
      Result(wsum, cnt, (System.nanoTime() - t0) / 1e9)
    } finally ctx.unregister()
  }

  /** Sum weights of the recorded forest edges (looked up by endpoints). */
  private def forestWeight(g: HostGraph, w: Array[Array[Double]], ctx: RunCtx): (Double, Int) = {
    // weight lookup: packed edge -> weight
    val map = new java.util.HashMap[java.lang.Long, java.lang.Double]()
    var c = 0
    while (c < g.chunks.length) {
      val arr = g.chunks(c); val warr = w(c)
      var j = 0
      while (j < arr.length) { map.put(arr(j), warr(j)); j += 1 }
      c += 1
    }
    var sum = 0.0; var cnt = 0
    ctx.forestEdges.foreach { case (u, v) =>
      val key = (math.min(u, v).toLong << 32) | math.max(u, v).toLong
      val x = map.get(key)
      if (x != null) { sum += x.doubleValue(); cnt += 1 }
    }
    (sum, cnt)
  }

  /** Exact MSF via parallel Borůvka (the GBBS-MSF stand-in): each round,
    * every component writeMins its lightest incident edge, then all
    * selected edges are unioned.
    */
  def boruvka(spark: SparkSession, g: HostGraph, w: Array[Array[Double]]): Result = {
    val t0 = System.nanoTime()
    val ctx = RunCtx.create(g.n)
    ctx.ensureForest()
    try {
      val (es, ws) = flatSorted(g, w)
      // rank == position in the weight-sorted order; pack (rank, idx)
      val minEdge = new AtomicLongArray(g.n)
      ctx.aux.put("bv-es", es)
      ctx.aux.put("bv-min", minEdge)
      val cid = ctx.id
      val nChunks = math.max(1, g.chunks.length)
      var changed = true
      while (changed) {
        var i0 = 0
        while (i0 < g.n) { minEdge.set(i0, Long.MaxValue); i0 += 1 }
        Par.maybeJobs(spark, es.length.toLong, nChunks) { i =>
          val cx = RunCtx.lookup(cid)
          val arr = cx.aux.get("bv-es").asInstanceOf[Array[Long]]
          val me = cx.aux.get("bv-min").asInstanceOf[AtomicLongArray]
          val (lo, hi) = Par.range(arr.length, nChunks, i)
          @inline def root(x0: Int): Int = {
            var x = x0; var p = cx.parents.get(x)
            while (p != x) { x = p; p = cx.parents.get(x) }
            x
          }
          @inline def wmin(idx: Int, v: Long): Unit = {
            var cur = me.get(idx)
            while (v < cur && !me.compareAndSet(idx, cur, v)) cur = me.get(idx)
          }
          var j = lo
          while (j < hi) {
            val e = arr(j)
            val ru = root((e >>> 32).toInt); val rv = root((e & 0xffffffffL).toInt)
            if (ru != rv) {
              val packed = (j.toLong << 1) // rank IS the index in sorted order
              wmin(ru, packed); wmin(rv, packed)
            }
            j += 1
          }
        }
        changed = false
        var v = 0
        while (v < g.n) {
          val p = minEdge.get(v)
          if (p != Long.MaxValue) {
            val j = (p >>> 1).toInt
            val e = es(j)
            if (UnionFind.union(ctx, ufOpt, (e >>> 32).toInt, (e & 0xffffffffL).toInt))
              changed = true
          }
          v += 1
        }
      }
      ctx.aux.remove("bv-es"); ctx.aux.remove("bv-min")
      val (wsum, cnt) = forestWeight(g, w, ctx)
      Result(wsum, cnt, (System.nanoTime() - t0) / 1e9)
    } finally ctx.unregister()
  }
}
