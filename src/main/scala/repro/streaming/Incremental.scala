package repro.streaming

import org.apache.spark.sql.SparkSession
import repro.core.{Par, RunCtx}
import repro.core.Options._
import repro.core.minbased.MinBased
import repro.core.uf.UnionFind

/** Batch-incremental / phase-concurrent streaming connectivity
  * (Section 3.5, Algorithm 3).
  *
  * Three algorithm types (paper classification):
  *  - Type 1: union-find variants without SpliceAtomic — INSERT and
  *    ISCONNECTED run fully concurrently inside one parallel job
  *    (wait-free asynchronous setting).
  *  - Type 2: Shiloach-Vishkin and root-based Liu-Tarjan — the batch's
  *    edges are run through the round-synchronous algorithm, then
  *    queries are answered.
  *  - Type 3: Rem's algorithms with SpliceAtomic — phase-concurrent: a
  *    barrier separates the update phase from the query phase.
  */
final class Incremental(spark: SparkSession, n: Int, finish: FinishOpt) {
  require(finish match {
    case _: UnionFindOpt => true
    case ShiloachVishkinOpt => true
    case lt: LiuTarjanOpt => lt.rootUp
    case _ => false
  }, s"${finish.name} does not support streaming (3.5)")

  private val ctx = RunCtx.create(n)
  finish match {
    case u: UnionFindOpt =>
      if (u.alg == UfHooks) ctx.ensureHooks()
      if (u.alg == UfRemLock) ctx.ensureLocks()
      if (u.alg == UfJtb) ctx.ensurePrio(n.toLong * 104729)
    case _ => ()
  }

  private def isPhaseConcurrent(u: UnionFindOpt): Boolean =
    u.splice == SpliceAtomic && (u.alg == UfRemCas || u.alg == UfRemLock)

  /** Process one batch of packed INSERT(u,v) edges and ISCONNECTED(u,v)
    * queries; returns one boolean per query.
    */
  def processBatch(updates: Array[Long], queries: Array[Long] = Array.empty): Array[Boolean] = {
    val results = new Array[Boolean](queries.length)
    ctx.aux.put("st-upd", updates)
    ctx.aux.put("st-qry", queries)
    ctx.aux.put("st-res", results)
    val cid = ctx.id
    val nChunks = Par.defaultChunks(spark)
    finish match {
      case u: UnionFindOpt if !isPhaseConcurrent(u) =>
        // Type 1: one job; each task applies its slice of updates AND
        // answers its slice of queries — fully concurrent ops.
        val work = updates.length.toLong + queries.length
        Par.maybeJobs(spark, work, nChunks) { i =>
          val cx = RunCtx.lookup(cid)
          val upd = cx.aux.get("st-upd").asInstanceOf[Array[Long]]
          val qry = cx.aux.get("st-qry").asInstanceOf[Array[Long]]
          val res = cx.aux.get("st-res").asInstanceOf[Array[Boolean]]
          val (ulo, uhi) = Par.range(upd.length, nChunks, i)
          var j = ulo
          while (j < uhi) {
            val e = upd(j)
            UnionFind.union(cx, u, (e >>> 32).toInt, (e & 0xffffffffL).toInt)
            j += 1
          }
          val (qlo, qhi) = Par.range(qry.length, nChunks, i)
          j = qlo
          while (j < qhi) {
            val q = qry(j)
            res(j) = UnionFind.find(cx, u, (q >>> 32).toInt) ==
                     UnionFind.find(cx, u, (q & 0xffffffffL).toInt)
            j += 1
          }
        }
      case u: UnionFindOpt =>
        // Type 3: phase-concurrent — updates, barrier, queries.
        Par.maybeJobs(spark, updates.length.toLong, nChunks) { i =>
          val cx = RunCtx.lookup(cid)
          val upd = cx.aux.get("st-upd").asInstanceOf[Array[Long]]
          val (ulo, uhi) = Par.range(upd.length, nChunks, i)
          var j = ulo
          while (j < uhi) {
            val e = upd(j)
            UnionFind.union(cx, u, (e >>> 32).toInt, (e & 0xffffffffL).toInt)
            j += 1
          }
        }
        answerQueriesByFind(u, queries.length, nChunks)
      case ShiloachVishkinOpt =>
        // Type 2: round-synchronous over the batch edges.
        MinBased.runShiloachVishkinEdges(spark, ctx, chunked(updates, nChunks))
        answerQueriesByResolve(queries.length, nChunks)
      case lt: LiuTarjanOpt =>
        MinBased.runLiuTarjanEdges(spark, ctx, chunked(updates, nChunks), lt)
        answerQueriesByResolve(queries.length, nChunks)
      case other => throw new IllegalStateException(other.name)
    }
    ctx.aux.remove("st-upd"); ctx.aux.remove("st-qry"); ctx.aux.remove("st-res")
    results
  }

  private def chunked(updates: Array[Long], nChunks: Int): Array[Array[Long]] = {
    val out = new Array[Array[Long]](nChunks)
    var i = 0
    while (i < nChunks) {
      val (lo, hi) = Par.range(updates.length, nChunks, i)
      out(i) = java.util.Arrays.copyOfRange(updates, lo, hi)
      i += 1
    }
    out
  }

  private def answerQueriesByFind(u: UnionFindOpt, nq: Int, nChunks: Int): Unit = {
    val cid = ctx.id
    Par.maybeJobs(spark, nq.toLong, nChunks) { i =>
      val cx = RunCtx.lookup(cid)
      val qry = cx.aux.get("st-qry").asInstanceOf[Array[Long]]
      val res = cx.aux.get("st-res").asInstanceOf[Array[Boolean]]
      val (qlo, qhi) = Par.range(qry.length, nChunks, i)
      var j = qlo
      while (j < qhi) {
        val q = qry(j)
        res(j) = UnionFind.find(cx, u, (q >>> 32).toInt) ==
                 UnionFind.find(cx, u, (q & 0xffffffffL).toInt)
        j += 1
      }
    }
  }

  private def answerQueriesByResolve(nq: Int, nChunks: Int): Unit = {
    val cid = ctx.id
    Par.maybeJobs(spark, nq.toLong, nChunks) { i =>
      val cx = RunCtx.lookup(cid)
      val qry = cx.aux.get("st-qry").asInstanceOf[Array[Long]]
      val res = cx.aux.get("st-res").asInstanceOf[Array[Boolean]]
      val (qlo, qhi) = Par.range(qry.length, nChunks, i)
      @inline def root(x0: Int): Int = {
        var x = x0; var p = cx.parents.get(x)
        while (p >= 0 && p != x) { x = p; p = cx.parents.get(x) }
        x
      }
      var j = qlo
      while (j < qhi) {
        val q = qry(j)
        res(j) = root((q >>> 32).toInt) == root((q & 0xffffffffL).toInt)
        j += 1
      }
    }
  }

  /** Current connectivity labeling (resolved). */
  def labels: Array[Int] = ctx.resolveLabels()

  def isConnected(u: Int, v: Int): Boolean = {
    val l = finish match {
      case uf: UnionFindOpt =>
        UnionFind.find(ctx, uf, u) == UnionFind.find(ctx, uf, v)
      case _ =>
        val a = ctx.resolveLabels(); a(u) == a(v)
    }
    l
  }

  def close(): Unit = ctx.unregister()
}
