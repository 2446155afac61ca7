package repro.core

import repro.{Oracle, SparkSpec, TestGraphs}
import repro.core.Options._
import repro.graph.Reference

/** Full framework composition: every sampling scheme combined with a
  * representative of every finish family (Algorithm 1), plus
  * DuckDB-oracle-checked invariants of the outputs.
  */
class ConnectItSpec extends SparkSpec {

  val samplings: Seq[SamplingOpt] = Seq(
    NoSampling, KOutSampling(), BfsSampling(), LddSampling())

  val finishes: Seq[FinishOpt] = Seq(
    UnionFindOpt(UfAsync, FindCompress),
    UnionFindOpt(UfHooks, FindAtomicHalve),
    UnionFindOpt(UfEarly, FindNaive),
    UnionFindOpt(UfRemCas, FindNaive, SplitAtomicOne),
    UnionFindOpt(UfRemCas, FindAtomicSplit, SpliceAtomic),
    UnionFindOpt(UfRemLock, FindNaive, HalveAtomicOne),
    UnionFindOpt(UfJtb, FindAtomicSplit),
    LiuTarjanOpt(ParentConnect, rootUp = false, fullShortcut = false, alter = false), // PUS
    LiuTarjanOpt(ParentConnect, rootUp = true, fullShortcut = true, alter = false),   // PRF
    LiuTarjanOpt(Connect, rootUp = true, fullShortcut = true, alter = true),          // CRFA
    StergiouOpt,
    ShiloachVishkinOpt,
    LabelPropOpt,
  )

  for {
    s <- samplings
    f <- finishes
    gname <- Seq("torus", "rmat", "multi")
  } test(s"${s.name} + ${f.name} on $gname") {
    val (_, g, ref) = TestGraphs.suite(spark).find(_._1 == gname).get
    val res = ConnectIt.connectivity(spark, g, s, f)
    assert(Reference.samePartition(res.labels, ref),
      s"labeling mismatch: ${s.name} + ${f.name} on $gname")
    assert(res.numComponents == Reference.numComponents(ref))
  }

  test("oracle: no edge crosses components (labels joined in SQL)") {
    import spark.implicits._
    val g = TestGraphs.rmat(spark)
    val res = ConnectIt.connectivity(spark, g, KOutSampling(),
      UnionFindOpt(UfRemCas))
    val edgesDf = spark.createDataset(g.edgeIterator.toSeq).toDF("u", "v")
    val labelsDf = spark.createDataset(
      res.labels.zipWithIndex.toSeq.map { case (l, v) => (v, l) }).toDF("v", "l")
    edgesDf.createOrReplaceTempView("edges_t")
    labelsDf.createOrReplaceTempView("labels_t")
    val sql =
      """SELECT count(*) AS violations
        |FROM edges_t e
        |JOIN labels_t la ON e.u = la.v
        |JOIN labels_t lb ON e.v = lb.v
        |WHERE la.l <> lb.l""".stripMargin
    val sparkDf = spark.sql(
      sql.replace("edges_t", "edges_t").replace("labels_t", "labels_t"))
    Oracle.assertEquivalent(sparkDf,
      sql.replace("edges_t", "edges").replace("labels_t", "labels"),
      "edges" -> edgesDf, "labels" -> labelsDf)
    assert(sparkDf.collect()(0).getLong(0) == 0L)
  }

  test("oracle: component size histogram matches DuckDB") {
    import spark.implicits._
    val g = TestGraphs.multi(spark)
    val res = ConnectIt.connectivity(spark, g, LddSampling(), ShiloachVishkinOpt)
    val labelsDf = spark.createDataset(
      res.labels.zipWithIndex.toSeq.map { case (l, v) => (v, l) }).toDF("v", "l")
    labelsDf.createOrReplaceTempView("labels_t")
    val sql =
      """SELECT sz AS component_size, count(*) AS num_components
        |FROM (SELECT l, count(*) AS sz FROM %s GROUP BY l) t
        |GROUP BY sz""".stripMargin
    Oracle.assertEquivalent(
      spark.sql(sql.format("labels_t")),
      sql.format("labels"),
      "labels" -> labelsDf)
  }

  test("sampling quality stats are sane on a connected graph") {
    val g = TestGraphs.torus(spark)
    val res = ConnectIt.connectivity(spark, g, KOutSampling(),
      UnionFindOpt(UfRemCas), sampleStats = true)
    assert(res.coverage >= 0.0 && res.coverage <= 1.0)
    assert(res.interCompFrac >= 0.0 && res.interCompFrac <= 1.0)
  }

  test("forest request on a non-root-based finish is rejected") {
    val g = TestGraphs.rmat(spark)
    assertThrows[IllegalArgumentException] {
      ConnectIt.connectivity(spark, g, NoSampling, LabelPropOpt, wantForest = true)
    }
  }
}
