package repro.dataflow

import repro.{Oracle, SparkSpec, TestGraphs}
import repro.core.ConnectIt
import repro.core.Options._
import repro.graph.{GraphGen, Reference}

/** The pure-DataFrame (Catalyst) connectivity baseline, cross-checked
  * against both the sequential reference and the shared-memory kernels.
  */
class DataflowSpec extends SparkSpec {

  test("DataflowCC matches reference on rmat") {
    val df = GraphGen.rmat(spark, 8, 800)
    val g = repro.graph.HostGraph.fromEdges(spark, df, nOverride = 256)
    val got = DataflowCC.ccArray(spark, df, 256)
    assert(Reference.samePartition(got, Reference.cc(g)))
  }

  test("DataflowCC matches reference on a multi-component graph") {
    val df = GraphGen.multiComponent(spark, 400, 300, 4)
    val g = repro.graph.HostGraph.fromEdges(spark, df, nOverride = 400)
    val got = DataflowCC.ccArray(spark, df, 400)
    assert(Reference.samePartition(got, Reference.cc(g)))
  }

  test("DataflowCC agrees with the shared-memory UF-Rem-CAS kernel") {
    val df = GraphGen.uniform(spark, 300, 900)
    val g = repro.graph.HostGraph.fromEdges(spark, df, nOverride = 300)
    val shared = ConnectIt.connectivity(spark, g, KOutSampling(),
      UnionFindOpt(UfRemCas)).labels
    val dataflow = DataflowCC.ccArray(spark, df, 300)
    assert(Reference.samePartition(shared, dataflow))
  }

  test("oracle: DataflowCC component count matches DuckDB count of distinct labels") {
    import spark.implicits._
    val df = GraphGen.multiComponent(spark, 200, 150, 2)
    val labels = DataflowCC.cc(spark, df, nOverride = 200).cache()
    labels.createOrReplaceTempView("labels_t")
    val sql = "SELECT count(DISTINCT l) AS num_components FROM %s"
    Oracle.assertEquivalent(spark.sql(sql.format("labels_t")),
      sql.format("labels"), "labels" -> labels)
  }
}
