package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.core.Options._
import repro.graph.Reference

/** Spanning forest (Algorithm 2): every root-based finish method
  * combined with every sampling method must emit a valid spanning
  * forest (right edge count, edges of G, inducing the same components).
  */
class SpanningForestSpec extends SparkSpec {

  val samplings: Seq[SamplingOpt] = Seq(
    NoSampling, KOutSampling(), BfsSampling(), LddSampling())

  val finishes: Seq[FinishOpt] = Seq(
    UnionFindOpt(UfAsync, FindNaive),
    UnionFindOpt(UfAsync, FindCompress),
    UnionFindOpt(UfHooks, FindAtomicSplit),
    UnionFindOpt(UfEarly, FindNaive),
    UnionFindOpt(UfRemCas, FindNaive, SplitAtomicOne),
    UnionFindOpt(UfRemCas, FindAtomicSplit, HalveAtomicOne),
    UnionFindOpt(UfRemLock, FindAtomicHalve, HalveAtomicOne),
    UnionFindOpt(UfJtb, FindNaive),
    ShiloachVishkinOpt,
    LiuTarjanOpt(ParentConnect, rootUp = true, fullShortcut = false, alter = false), // PRS
    LiuTarjanOpt(ParentConnect, rootUp = true, fullShortcut = true, alter = false),  // PRF
  )

  for {
    s <- samplings
    f <- finishes
    gname <- Seq("torus", "rmat", "multi")
  } test(s"forest: ${s.name} + ${f.name} on $gname") {
    val (_, g, _) = TestGraphs.suite(spark).find(_._1 == gname).get
    val res = ConnectIt.spanningForest(spark, g, s, f)
    assert(Reference.validSpanningForest(g, res.forest),
      s"invalid forest: ${s.name} + ${f.name} on $gname " +
      s"(${res.forest.length} edges, n=${g.n})")
  }

  test("forest with Rem's SpliceAtomic is rejected (unsound witness recording)") {
    val g = TestGraphs.rmat(spark)
    assertThrows[IllegalArgumentException] {
      ConnectIt.connectivity(spark, g, NoSampling,
        UnionFindOpt(UfRemCas, FindNaive, SpliceAtomic), wantForest = true)
    }
  }

  test("forest of a path is the path itself") {
    val g = TestGraphs.path(spark)
    val res = ConnectIt.spanningForest(spark, g, NoSampling,
      UnionFindOpt(UfRemCas))
    assert(res.forest.length == g.n - 1)
  }

  test("isRootBased classification matches Section 3.4") {
    assert(isRootBased(UnionFindOpt(UfRemCas)))
    assert(isRootBased(ShiloachVishkinOpt))
    assert(isRootBased(LiuTarjanOpt(ParentConnect, rootUp = true, fullShortcut = true, alter = false)))
    assert(!isRootBased(LabelPropOpt))
    assert(!isRootBased(StergiouOpt))
    assert(!isRootBased(LiuTarjanOpt(ParentConnect, rootUp = false, fullShortcut = false, alter = false)))
  }
}
