package repro.bench

import org.apache.spark.sql.SparkSession
import repro.graph.{GraphGen, HostGraph}

/** The benchmark graph suite — synthetic analogues of Table 2's inputs
  * at laptop scale (see the Data substitutions section of DESIGN.md).
  *
  * | name | paper graph  | generator                           | role |
  * | RO   | road_usa     | 2-D torus 500x500                   | high diameter, avg degree 4 |
  * | LJ   | LiveJournal  | RMAT scale 16, 1.2M samples         | small social network |
  * | CO   | com-Orkut    | uniform n=32k, 1.5M samples         | dense, single component |
  * | TW   | Twitter      | RMAT scale 18, 3M samples           | large skewed network |
  * | FR   | Friendster   | Barabási–Albert n=300k, d=8         | large social network |
  * | CW   | ClueWeb      | webLike scale 18, 3M, 30% isolated  | web graph, many components |
  */
object GraphSuite {
  val names: Seq[String] = Seq("RO", "LJ", "CO", "TW", "FR", "CW")

  private var cache = Map.empty[String, HostGraph]

  def graph(spark: SparkSession, name: String): HostGraph = synchronized {
    cache.get(name) match {
      case Some(g) => g
      case None =>
        val g = build(spark, name)
        cache += name -> g
        g
    }
  }

  def all(spark: SparkSession): Seq[(String, HostGraph)] =
    names.map(n => n -> graph(spark, n))

  private def build(spark: SparkSession, name: String): HostGraph = name match {
    case "RO" => HostGraph.fromEdges(spark, GraphGen.torus2d(spark, 500, 500))
    case "LJ" => HostGraph.fromEdges(spark, GraphGen.rmat(spark, 16, 1_200_000),
                                     nOverride = 1 << 16)
    case "CO" => HostGraph.fromEdges(spark, GraphGen.uniform(spark, 32_768, 1_500_000),
                                     nOverride = 32_768)
    case "TW" => HostGraph.fromEdges(spark, GraphGen.rmat(spark, 18, 3_000_000),
                                     nOverride = 1 << 18)
    case "FR" => HostGraph.fromEdges(spark, GraphGen.barabasiAlbert(spark, 300_000, 8))
    case "CW" => HostGraph.fromEdges(spark, GraphGen.webLike(spark, 18, 3_000_000),
                                     nOverride = ((1 << 18) * 1.3).toInt)
    case other => throw new IllegalArgumentException(other)
  }

  /** Dense crossover graph (Table 3b): enough edges per vertex that the
    * finish phase's per-edge work dominates fixed job barriers.
    */
  def dense(spark: SparkSession): HostGraph = synchronized {
    cache.getOrElse("XL", {
      // n large enough that the parents array escapes the LLC — that is
      // where the paper's per-edge finish cost (and thus the sampling
      // win) lives; m/n high enough that edge work dominates barriers.
      val g = HostGraph.fromEdges(spark,
        GraphGen.uniform(spark, 2_000_000, 80_000_000), nOverride = 2_000_000)
      cache += "XL" -> g; g
    })
  }

  /** Drop a cached graph (frees its arrays and SharedState slot) and
    * collect immediately so later microbenches don't absorb the GC debt.
    */
  def release(name: String): Unit = synchronized {
    cache.get(name).foreach(_.unregister())
    cache -= name
    System.gc()
  }

  /** Streaming-suite extras (Table 4): RMAT and BA update streams. */
  def rmatStream(spark: SparkSession): HostGraph = synchronized {
    cache.getOrElse("RM", {
      val g = HostGraph.fromEdges(spark, GraphGen.rmat(spark, 18, 2_600_000),
                                  nOverride = 1 << 18)
      cache += "RM" -> g; g
    })
  }

  def baStream(spark: SparkSession): HostGraph = synchronized {
    cache.getOrElse("BA", {
      val g = HostGraph.fromEdges(spark, GraphGen.barabasiAlbert(spark, 260_000, 10))
      cache += "BA" -> g; g
    })
  }
}
