package repro

import org.apache.spark.sql.SparkSession
import repro.graph.{GraphGen, HostGraph, Reference}

/** Small graphs shared across test suites (built once per JVM). */
object TestGraphs {
  private var cache = Map.empty[String, HostGraph]

  def get(name: String)(build: => HostGraph): HostGraph = synchronized {
    cache.get(name) match {
      case Some(g) => g
      case None =>
        val g = build
        cache += name -> g
        g
    }
  }

  def path(spark: SparkSession): HostGraph =
    get("path")(HostGraph.fromEdges(spark, GraphGen.path(spark, 300)))

  def torus(spark: SparkSession): HostGraph =
    get("torus")(HostGraph.fromEdges(spark, GraphGen.torus2d(spark, 16, 16)))

  def rmat(spark: SparkSession): HostGraph =
    get("rmat")(HostGraph.fromEdges(spark, GraphGen.rmat(spark, 10, 4000), nOverride = 1 << 10))

  def star(spark: SparkSession): HostGraph =
    get("star")(HostGraph.fromEdges(spark, GraphGen.star(spark, 500)))

  def multi(spark: SparkSession): HostGraph =
    get("multi")(HostGraph.fromEdges(spark,
      GraphGen.multiComponent(spark, 1200, 900, 4), nOverride = 1200))

  def uniform(spark: SparkSession): HostGraph =
    get("uniform")(HostGraph.fromEdges(spark, GraphGen.uniform(spark, 800, 3000), nOverride = 800))

  /** Suite of (name, graph, reference labels) used by cross-product tests. */
  def suite(spark: SparkSession): Seq[(String, HostGraph, Array[Int])] = {
    val gs = Seq(
      "path" -> path(spark),
      "torus" -> torus(spark),
      "rmat" -> rmat(spark),
      "star" -> star(spark),
      "multi" -> multi(spark),
      "uniform" -> uniform(spark),
    )
    gs.map { case (n, g) => (n, g, Reference.cc(g)) }
  }
}
