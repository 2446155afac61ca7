package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core.{ConnectIt, Par, RunCtx}
import repro.core.Options._
import repro.baselines.Baselines
import repro.graph.{HostGraph, Reference}
import repro.streaming.{Incremental, StingerLike}

/** Benchmark harnesses, one per evaluation table of the paper. Each
  * prints the table's rows (and returns them) so `bench/test` output can
  * be diffed against EXPERIMENTS.md.
  */
object Tables {

  def time[T](f: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1e9)
  }

  def fmt(s: Double): String =
    if (s == 0.0) "0" else if (s < 0.01) f"$s%.2e" else f"$s%.3f"

  private def emit(lines: Seq[String]): Seq[String] = {
    lines.foreach(l => println(s"[table] $l"))
    lines
  }

  // ------------------------------------------------------------ configs
  /** The fastest overall configuration (paper Section 4.2 takeaway). */
  val fastest: (SamplingOpt, FinishOpt) =
    (KOutSampling(2, KOutHybrid), UnionFindOpt(UfRemCas, FindNaive, SplitAtomicOne))

  /** Table 3 finish families; each is benched as the min over its listed
    * option variants (the paper reports the fastest option per family).
    */
  val t3Families: Seq[(String, Seq[FinishOpt])] = Seq(
    "UF-Early" -> Seq(UnionFindOpt(UfEarly, FindNaive)),
    "UF-Hooks" -> Seq(UnionFindOpt(UfHooks, FindNaive)),
    "UF-Async" -> Seq(UnionFindOpt(UfAsync, FindAtomicHalve)),
    "UF-Rem-CAS" -> Seq(UnionFindOpt(UfRemCas, FindNaive, SplitAtomicOne)),
    "UF-Rem-Lock" -> Seq(UnionFindOpt(UfRemLock, FindNaive, SplitAtomicOne)),
    "UF-JTB" -> Seq(UnionFindOpt(UfJtb, FindAtomicSplit)),
    "Liu-Tarjan" -> Seq(
      LiuTarjanOpt(ExtendedConnect, rootUp = false, fullShortcut = true, alter = false), // EUF
      LiuTarjanOpt(ParentConnect, rootUp = true, fullShortcut = true, alter = false),    // PRF
      LiuTarjanOpt(ParentConnect, rootUp = false, fullShortcut = false, alter = false),  // PUS
      LiuTarjanOpt(Connect, rootUp = true, fullShortcut = true, alter = true),           // CRFA
    ),
    "SV" -> Seq(ShiloachVishkinOpt),
    "Label-Prop." -> Seq(LabelPropOpt),
  )

  val t3Samplings: Seq[(String, SamplingOpt)] = Seq(
    "No Sampling" -> NoSampling,
    "k-out Sampling" -> KOutSampling(2, KOutHybrid),
    "BFS Sampling" -> BfsSampling(),
    "LDD Sampling" -> LddSampling(0.2),
  )

  /** One timed connectivity run; asserts correctness against reference. */
  def timedCC(spark: SparkSession, g: HostGraph, s: SamplingOpt,
              f: FinishOpt): Double = {
    val (res, _) = time(ConnectIt.connectivity(spark, g, s, f))
    res.totalSec
  }

  // ============================================================= Table 1
  /** Largest-graph showcase: our biggest suite graphs under the fastest
    * configuration, next to the paper's published system rows (which are
    * recorded in EXPERIMENTS.md — absolute times are not comparable).
    */
  def table1(spark: SparkSession): Seq[String] = {
    val rows = Seq("CW", "TW", "FR").map { name =>
      val g = GraphSuite.graph(spark, name)
      val (s, f) = fastest
      timedCC(spark, g, s, f) // warm
      val t = timedCC(spark, g, s, f)
      f"$name%-4s n=${g.n}%-9d m=${g.m}%-9d fastest-ConnectIt(k-out+UF-Rem-CAS)=${fmt(t)}s"
    }
    emit(rows)
  }

  // ============================================================= Table 2
  /** Graph inputs: n, m, effective diameter, #components, largest
    * component, load time.
    */
  def table2(spark: SparkSession): Seq[String] = {
    val rows = GraphSuite.all(spark).map { case (name, g) =>
      val labels = Reference.cc(g)
      val nc = Reference.numComponents(labels)
      val largest = Reference.largestComponent(labels)
      val diam = effectiveDiameter(g)
      f"$name%-4s n=${g.n}%-9d m=${g.m}%-9d diam~$diam%-6d numC=$nc%-7d largestC=$largest%-9d load=${fmt(g.loadTimeSec)}s"
    }
    emit(rows)
  }

  /** Max BFS eccentricity from a few sources (lower bound, like the
    * paper's starred effective diameters).
    */
  def effectiveDiameter(g: HostGraph, tries: Int = 2): Int = {
    var best = 0
    var t = 0
    var src = 0
    while (t < tries) {
      // sequential BFS (stats only)
      val dist = new Array[Int](g.n)
      java.util.Arrays.fill(dist, -1)
      while (src < g.n && g.degree(src) == 0) src += 1
      if (src >= g.n) return best
      val q = new java.util.ArrayDeque[Integer]()
      q.add(src); dist(src) = 0
      var far = src
      while (!q.isEmpty) {
        val v = q.poll().intValue()
        if (dist(v) > dist(far)) far = v
        var j = g.offsets(v)
        while (j < g.offsets(v + 1)) {
          val w = g.targets(j)
          if (dist(w) == -1) { dist(w) = dist(v) + 1; q.add(w) }
          j += 1
        }
      }
      best = math.max(best, dist(far))
      src = far // second try: from the farthest vertex (double sweep)
      t += 1
    }
    best
  }

  // ============================================================= Table 3
  /** Running times of every finish family under every sampling scheme,
    * plus the reimplemented "Other Systems".
    */
  def table3(spark: SparkSession): Seq[String] = {
    val graphs = GraphSuite.all(spark)
    System.gc() // quiet heap before timing
    // warm the whole stack once
    timedCC(spark, graphs.head._2, fastest._1, fastest._2)
    val out = scala.collection.mutable.ArrayBuffer.empty[String]
    for ((sname, s) <- t3Samplings; (fname, opts) <- t3Families) {
      val cells = graphs.map { case (_, g) =>
        fmt(opts.map(o => timedCC(spark, g, s, o)).min)
      }
      out += f"$sname%-16s $fname%-12s ${cells.map(c => f"$c%-10s").mkString}"
    }
    // other systems
    val others: Seq[(String, (SparkSession, HostGraph) => Double)] = Seq(
      "BFSCC" -> ((sp, g) => time(Baselines.bfsCC(sp, g))._2),
      "WorkeffCC" -> ((sp, g) => time(Baselines.workEffCC(sp, g))._2),
      "MultiStep" -> ((sp, g) => Baselines.multiStep(sp, g).totalSec),
      "GAP-SV" -> ((sp, g) => Baselines.gapSV(sp, g).totalSec),
      "GAP-AF" -> ((sp, g) => Baselines.afforest(sp, g).totalSec),
    )
    for ((name, run) <- others) {
      val cells = graphs.map { case (_, g) => fmt(run(spark, g)) }
      out += f"${"Other Systems"}%-16s $name%-12s ${cells.map(c => f"$c%-10s").mkString}"
    }
    emit(f"${"Sampling"}%-16s ${"Algorithm"}%-12s ${graphs.map(g => f"${g._1}%-10s").mkString}" +: out.toSeq)
  }

  /** Sampling-speedup crossover (the paper's central Table 3 claim):
    * on a dense graph where per-edge finish work dominates the fixed
    * parallel-for barriers, two-phase execution must beat the unsampled
    * run. (At 1-3M edges our Spark job barriers hide the effect; the
    * paper's graphs are 50-75,000x larger.)
    */
  def table3b(spark: SparkSession): Seq[String] = {
    val g = GraphSuite.dense(spark)
    val f = fastest._2
    timedCC(spark, g, NoSampling, f) // warm
    val rows = t3Samplings.map { case (sname, s) =>
      val res = (1 to 3).map(_ =>
        ConnectIt.connectivity(spark, g, s, f)).minBy(_.totalSec)
      f"XL(n=${g.n},m=${g.m}) $sname%-16s UF-Rem-CAS total=${fmt(res.totalSec)}s sample=${fmt(res.sampleSec)}s finish=${fmt(res.finishSec)}s"
    }
    GraphSuite.release("XL")
    emit(rows)
  }

  // ============================================================= Table 4
  /** Max streaming throughput (edge updates/second): the whole edge set
    * as one parallel batch, per algorithm family.
    */
  def table4(spark: SparkSession): Seq[String] = {
    val graphs = GraphSuite.all(spark) ++ Seq(
      "RM" -> GraphSuite.rmatStream(spark),
      "BA" -> GraphSuite.baStream(spark))
    val algs: Seq[(String, FinishOpt)] = Seq(
      "UF-Early" -> UnionFindOpt(UfEarly, FindNaive),
      "UF-Hooks" -> UnionFindOpt(UfHooks, FindNaive),
      "UF-Async" -> UnionFindOpt(UfAsync, FindAtomicHalve),
      "UF-Rem-CAS" -> UnionFindOpt(UfRemCas, FindNaive, SplitAtomicOne),
      "UF-Rem-Lock" -> UnionFindOpt(UfRemLock, FindNaive, SplitAtomicOne),
      "UF-JTB" -> UnionFindOpt(UfJtb, FindAtomicSplit),
      "Liu-Tarjan" -> LiuTarjanOpt(Connect, rootUp = true, fullShortcut = true, alter = true),
      "SV" -> ShiloachVishkinOpt,
    )
    val batches: Map[String, Array[Long]] = graphs.map { case (n, g) =>
      n -> g.chunks.foldLeft(Array.emptyLongArray)(_ ++ _)
    }.toMap
    System.gc() // quiet heap before timing
    val header = f"${"Algorithm"}%-12s ${graphs.map(g => f"${g._1}%-10s").mkString}"
    val rows = algs.map { case (name, alg) =>
      val cells = graphs.map { case (gn, g) =>
        val batch = batches(gn)
        def runOnce(): Double = {
          val inc = new Incremental(spark, g.n, alg)
          try { val (_, t) = time(inc.processBatch(batch)); t }
          finally inc.close()
        }
        runOnce() // warm
        val t = runOnce()
        f"${batch.length / t / 1e6}%.1fM"
      }
      f"$name%-12s ${cells.map(c => f"$c%-10s").mkString}"
    }
    emit(header +: rows)
  }

  // ============================================================= Table 5
  /** STINGER-substitute vs ConnectIt UF-Rem-CAS(SplitAtomicOne) on RMAT
    * update batches of growing size, inserted into an empty graph.
    */
  def table5(spark: SparkSession, n: Int = 1 << 20): Seq[String] = {
    val totalEdges = 2_000_000
    val allEdges = {
      val g = GraphSuite.rmatStream(spark)
      val flat = g.chunks.foldLeft(Array.emptyLongArray)(_ ++ _)
      // remap into [0, n) and take totalEdges
      flat.take(totalEdges).map { e =>
        val u = ((e >>> 32) % n).toInt; val v = ((e & 0xffffffffL) % n).toInt
        (u.toLong << 32) | (v.toLong & 0xffffffffL)
      }
    }
    val sizes = Seq(10, 100, 1000, 10_000, 100_000, 1_000_000, 2_000_000)
    val rows = sizes.map { bs =>
      val nBatches = math.max(1, math.min(allEdges.length / bs, 50))
      val edges = allEdges.take(bs * nBatches)
      // STINGER-substitute
      val st = new StingerLike(n)
      val (_, stT) = time {
        edges.grouped(bs).foreach(st.insertBatch)
      }
      val stPer = stT / nBatches
      // ConnectIt
      val inc = new Incremental(spark, n,
        UnionFindOpt(UfRemCas, FindNaive, SplitAtomicOne))
      val ciPer = try {
        val (_, t) = time { edges.grouped(bs).foreach(b => inc.processBatch(b)) }
        t / nBatches
      } finally inc.close()
      f"batch=$bs%-9d stinger-like=${fmt(stPer)}s (${bs / stPer}%.3g upd/s)   connectit=${fmt(ciPer)}s (${bs / ciPer}%.3g upd/s)   speedup=${stPer / ciPer}%.0fx"
    }
    emit(rows)
  }

  // ========================================================= Tables 6, 7
  /** Sampling quality: time, coverage of the most frequent component,
    * fraction of inter-component edges remaining.
    */
  def samplingQualityRow(spark: SparkSession, name: String, g: HostGraph,
                         s: SamplingOpt): String = {
    val ctx = RunCtx.create(g.n)
    try {
      val (_, t) = time {
        s match {
          case KOutSampling(k, v, seed) =>
            repro.core.sampling.KOutSampling.sample(spark, g, ctx, k, v, seed)
          case BfsSampling(c, seed) =>
            repro.core.sampling.BfsSampling.sample(spark, g, ctx, c, seed)
          case LddSampling(b, p, seed) =>
            repro.core.sampling.LddSampling.sample(spark, g, ctx, b, p, seed)
          case NoSampling => ()
        }
        ConnectIt.normalizeSampled(spark, ctx)
      }
      ctx.snapshotSampled()
      val freq = ConnectIt.identifyFrequent(ctx.sampled)
      val (cov, ic) = ConnectIt.samplingQuality(spark, g, ctx, freq)
      f"$name%-4s ${s.name}%-26s time=${fmt(t)}s cov=${cov * 100}%.1f%% ic=${ic * 100}%.4f%%"
    } finally ctx.unregister()
  }

  def table6(spark: SparkSession): Seq[String] =
    emit(GraphSuite.all(spark).flatMap { case (name, g) =>
      Seq(samplingQualityRow(spark, name, g, BfsSampling()),
          samplingQualityRow(spark, name, g, LddSampling(0.2)))
    })

  def table7(spark: SparkSession): Seq[String] =
    emit(GraphSuite.all(spark).map { case (name, g) =>
      samplingQualityRow(spark, name, g, KOutSampling(2, KOutHybrid))
    })

  // ============================================================= Table 8
  /** MapEdges / GatherEdges primitives vs the fastest ConnectIt times
    * with and without sampling.
    */
  def table8(spark: SparkSession): Seq[String] = {
    val rows = GraphSuite.all(spark).map { case (name, g) =>
      val (_, mapT0) = time(mapEdges(spark, g)); val (_, mapT) = time(mapEdges(spark, g))
      val (_, gatT0) = time(gatherEdges(spark, g)); val (_, gatT) = time(gatherEdges(spark, g))
      val noS = timedCC(spark, g, NoSampling, fastest._2)
      val withS = timedCC(spark, g, fastest._1, fastest._2)
      f"$name%-4s MapEdges=${fmt(math.min(mapT0, mapT))}s GatherEdges=${fmt(math.min(gatT0, gatT))}s ConnectIt(NoSample)=${fmt(noS)}s ConnectIt(Sample)=${fmt(withS)}s"
    }
    emit(rows)
  }

  /** Reduce +1 over every directed edge (reads the CSR sequentially). */
  def mapEdges(spark: SparkSession, g: HostGraph): Long = {
    val acc = spark.sparkContext.longAccumulator("map-edges")
    val gid = g.id
    val nChunks = Par.defaultChunks(spark)
    Par.jobs(spark, nChunks) { i =>
      val gr = HostGraph.lookup(gid)
      val (lo, hi) = Par.range(gr.n, nChunks, i)
      var s = 0L
      var v = lo
      while (v < hi) { s += gr.degree(v); v += 1 }
      acc.add(s)
    }
    acc.value
  }

  /** Indirect read per directed edge (degree of the neighbour). */
  def gatherEdges(spark: SparkSession, g: HostGraph): Long = {
    val acc = spark.sparkContext.longAccumulator("gather-edges")
    val gid = g.id
    val nChunks = Par.defaultChunks(spark)
    Par.jobs(spark, nChunks) { i =>
      val gr = HostGraph.lookup(gid)
      val (lo, hi) = Par.range(gr.n, nChunks, i)
      var s = 0L
      var v = lo
      while (v < hi) {
        var j = gr.offsets(v)
        while (j < gr.offsets(v + 1)) {
          val w = gr.targets(j)
          s += gr.offsets(w + 1) - gr.offsets(w) // indirect read
          j += 1
        }
        v += 1
      }
      acc.add(s)
    }
    acc.value
  }
}
