package repro.graph

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}

/** Graph statistics computed in Spark SQL, cross-checked row-for-row
  * against DuckDB via the oracle (Table V's measurement path).
  */
class GraphStatsSpec extends SparkSpec {

  private lazy val cfg = GraphGen.datasets("ACM")
  private lazy val edges = GraphGen.edgesDF(spark, cfg).cache()
  private lazy val nodes = GraphGen.nodesDF(spark, cfg).cache()

  test("edge count matches DuckDB") {
    val df = edges.agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(df, "SELECT count(*) AS n FROM edges", "edges" -> edges)
  }

  test("directed view doubles the edge count (oracle)") {
    val df = GraphStats.directedView(edges).agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(df,
      "SELECT count(*) AS n FROM (SELECT src, dst FROM edges UNION ALL SELECT dst, src FROM edges)",
      "edges" -> edges)
  }

  test("per-node degrees match DuckDB") {
    val df = GraphStats.degrees(edges)
    Oracle.assertEquivalent(df,
      """SELECT node, count(*) AS degree FROM (
        |  SELECT src AS node FROM edges UNION ALL SELECT dst AS node FROM edges
        |) GROUP BY node""".stripMargin,
      "edges" -> edges)
  }

  test("type histogram matches DuckDB") {
    val df = GraphStats.typeHistogram(nodes)
    Oracle.assertEquivalent(df,
      "SELECT type, count(*) AS cnt FROM nodes GROUP BY type",
      "nodes" -> nodes)
  }

  test("mean degree via SQL matches CSR meanDegree") {
    val g = GraphGen.buildCSR(spark, cfg)
    val e = GraphStats.edgeCount(edges)
    assert(math.abs(2.0 * e / cfg.numNodes - g.meanDegree) < 1e-9)
  }

  test("weighted degree (strength) matches DuckDB") {
    val directed = edges.select(col("src"), col("dst"), col("weight"))
      .union(edges.select(col("dst") as "src", col("src") as "dst", col("weight")))
    val df = directed.groupBy(col("src") as "node")
      .agg(round(sum(col("weight")), 3) as "strength")
    Oracle.assertEquivalent(df,
      """SELECT node, round(sum(weight), 3) AS strength FROM (
        |  SELECT src AS node, CAST(weight AS DOUBLE) AS weight FROM edges
        |  UNION ALL SELECT dst AS node, CAST(weight AS DOUBLE) AS weight FROM edges
        |) GROUP BY node""".stripMargin,
      "edges" -> edges)
  }

  test("forConfig produces the Table V row shape") {
    val s = GraphStats.forConfig(spark, cfg)
    assert(s.name == "ACM")
    assert(s.numNodes == cfg.numNodes)
    assert(s.numEdges > 0)
    assert(math.abs(s.meanDegree - 2.0 * s.numEdges / s.numNodes) < 1e-9)
    assert(s.numNodeTypes == 3)
  }

  test("forGraph agrees with forConfig on the same dataset") {
    val fromDf = GraphStats.forConfig(spark, cfg)
    val fromCsr = GraphStats.forGraph("ACM", GraphGen.buildCSR(spark, cfg))
    assert(fromDf.numEdges == fromCsr.numEdges)
    assert(math.abs(fromDf.meanDegree - fromCsr.meanDegree) < 1e-9)
  }
}
