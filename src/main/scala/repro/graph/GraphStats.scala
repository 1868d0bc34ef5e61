package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Dataset statistics row matching Table V's columns. */
final case class DatasetStats(
    name: String,
    numNodes: Long,
    numEdges: Long,
    meanDegree: Double,
    numNodeTypes: Int,
)

/** DataFrame/Catalyst computations of the Table V statistics.
  *
  * Everything here is expressed in Spark SQL over the generator's edge and
  * node frames so the DuckDB oracle can replay the same queries
  * (`GraphStatsSpec`) — the CSR build is then cross-checked against these.
  */
object GraphStats {

  /** Directed adjacency view (both directions) of an undirected edge frame. */
  def directedView(edges: DataFrame): DataFrame =
    edges.select(col("src"), col("dst"))
      .union(edges.select(col("dst") as "src", col("src") as "dst"))

  /** Per-node degree frame (node, degree) over the directed view; nodes
    * with no edges are absent (join against the node frame to zero-fill).
    */
  def degrees(edges: DataFrame): DataFrame =
    directedView(edges).groupBy(col("src") as "node")
      .agg(count(lit(1)) as "degree")

  /** Undirected edge count. */
  def edgeCount(edges: DataFrame): Long = edges.count()

  /** Histogram of node types (type, cnt). */
  def typeHistogram(nodes: DataFrame): DataFrame =
    nodes.groupBy(col("type")).agg(count(lit(1)) as "cnt")

  /** Compute the Table V row for one dataset config. */
  def forConfig(spark: SparkSession, cfg: DatasetConfig): DatasetStats = {
    val edges = GraphGen.edgesDF(spark, cfg)
    val e = edgeCount(edges)
    DatasetStats(cfg.name, cfg.numNodes, e, 2.0 * e / cfg.numNodes, cfg.numTypes)
  }

  /** Same statistics read off a built CSR — used to verify that the CSR
    * construction preserved the frame's contents.
    */
  def forGraph(name: String, g: CSRGraph): DatasetStats =
    DatasetStats(name, g.numNodes, g.numUndirectedEdges, g.meanDegree, g.numTypes)
}
