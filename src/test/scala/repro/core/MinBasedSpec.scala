package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.core.Options._
import repro.graph.Reference

/** Liu-Tarjan variants (all 16), Stergiou, Shiloach-Vishkin and
  * Label-Propagation against the sequential reference.
  */
class MinBasedSpec extends SparkSpec {

  val finishes: Seq[FinishOpt] =
    liuTarjanVariants ++ Seq(StergiouOpt, ShiloachVishkinOpt, LabelPropOpt)

  for {
    f <- finishes
    gname <- Seq("path", "torus", "rmat", "star", "multi")
  } test(s"${f.name} matches reference on $gname (no sampling)") {
    val (_, g, ref) = TestGraphs.suite(spark).find(_._1 == gname).get
    val res = ConnectIt.connectivity(spark, g, NoSampling, f)
    assert(Reference.samePartition(res.labels, ref),
      s"labeling mismatch for ${f.name} on $gname")
  }

  test("the paper's 16 Liu-Tarjan variants are all generated") {
    assert(liuTarjanVariants.size == 16)
    val names = liuTarjanVariants.map(_.name).toSet
    // spot-check the five originals + CRFA (fastest streaming variant)
    assert(names.contains("LT-CUSA"))
    assert(names.contains("LT-PUS"))
    assert(names.contains("LT-PRS"))
    assert(names.contains("LT-CRFA"))
    assert(names.contains("LT-EUF"))
  }
}
