package repro.bench

import repro.SparkSpec
import repro.exp.TableV
import repro.graph.GraphGen

/** Table V benchmark: the synthetic datasets' statistics, printed next to
  * the paper's. Asserts the -lite graphs track their configured targets
  * (mean degree within ~35% of the paper dataset they stand in for).
  */
class TableVBench extends SparkSpec {

  private lazy val rows = TableV.run(spark)

  test("render Table V (paper vs measured)") {
    println(TableV.render(rows))
    assert(rows.size == 12)
  }

  test("every dataset's edge count is near its configured target") {
    rows.foreach { r =>
      val target = GraphGen.datasets(r.stats.name).targetUndirectedEdges
      assert(r.stats.numEdges > target * 0.7 && r.stats.numEdges < target * 1.3,
             s"${r.stats.name}: ${r.stats.numEdges} vs target $target")
    }
  }

  test("mean degrees track the paper datasets") {
    rows.foreach { r =>
      val ratio = r.stats.meanDegree / r.paperMeanDegree
      assert(ratio > 0.65 && ratio < 1.45,
             s"${r.stats.name}: deg ${r.stats.meanDegree} vs paper ${r.paperMeanDegree}")
    }
  }

  test("type counts match the paper (3 for heterogeneous, 1 otherwise)") {
    val het = Set("ACM", "DBLP", "DBIS", "AMiner")
    rows.foreach { r =>
      assert(r.stats.numNodeTypes == (if (het(r.stats.name)) 3 else 1), r.stats.name)
    }
  }

  test("the two billion-edge stand-ins are the largest -lite graphs") {
    val bySize = rows.sortBy(-_.stats.numEdges).map(_.stats.name).take(2).toSet
    assert(bySize == Set("Twitter", "Web-UK"))
  }
}
