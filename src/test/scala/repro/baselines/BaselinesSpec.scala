package repro.baselines

import repro.{SparkSpec, TestGraphs}
import repro.graph.Reference

/** The reimplemented "Other Systems" comparators of Table 3. */
class BaselinesSpec extends SparkSpec {

  for (gname <- Seq("path", "torus", "rmat", "multi", "star")) {
    test(s"BFSCC matches reference on $gname") {
      val (_, g, ref) = TestGraphs.suite(spark).find(_._1 == gname).get
      assert(Reference.samePartition(Baselines.bfsCC(spark, g), ref))
    }
    test(s"WorkeffCC matches reference on $gname") {
      val (_, g, ref) = TestGraphs.suite(spark).find(_._1 == gname).get
      assert(Reference.samePartition(Baselines.workEffCC(spark, g), ref))
    }
    test(s"MultiStep matches reference on $gname") {
      val (_, g, ref) = TestGraphs.suite(spark).find(_._1 == gname).get
      assert(Reference.samePartition(Baselines.multiStep(spark, g).labels, ref))
    }
    test(s"GAP-SV matches reference on $gname") {
      val (_, g, ref) = TestGraphs.suite(spark).find(_._1 == gname).get
      assert(Reference.samePartition(Baselines.gapSV(spark, g).labels, ref))
    }
    test(s"Afforest matches reference on $gname") {
      val (_, g, ref) = TestGraphs.suite(spark).find(_._1 == gname).get
      assert(Reference.samePartition(Baselines.afforest(spark, g).labels, ref))
    }
  }
}
