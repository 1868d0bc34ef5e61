package repro.bench

import repro.SparkSpec
import repro.exp.TableII

/** Table II benchmark: rejection-sampler sensitivity of node2vec on
  * Flickr-lite. Asserts the paper's *shape*: acceptance ratio collapses
  * exactly for the hyper-parameter settings the paper reports, and the
  * sampling time moves inversely with it.
  */
class TableIIBench extends SparkSpec {

  private lazy val rows = TableII.run(spark) // paper workload: 10 x 80
  private def byPQ(p: Double, q: Double) = rows.find(r => r.p == p && r.q == q).get

  test("render Table II (paper vs measured)") {
    println(TableII.render(rows))
    assert(rows.size == 5)
  }

  test("acceptance is perfect at (1,1) — proposal equals target") {
    assert(byPQ(1, 1).acRatio > 0.95)
  }

  test("acceptance collapses at (0.25,1), the paper's worst case") {
    val ac = byPQ(0.25, 1).acRatio
    assert(ac < 0.5, s"ac=$ac")
    assert(ac < byPQ(1, 1).acRatio)
  }

  test("acceptance degrades at (1,4) — q-side outliers") {
    val ac = byPQ(1, 4).acRatio
    assert(ac < 0.65, s"ac=$ac")
  }

  test("(4,1) stays near-perfect, (1,0.25) degrades mildly (paper ordering)") {
    assert(byPQ(4, 1).acRatio > 0.85)
    val mid = byPQ(1, 0.25).acRatio
    assert(mid > byPQ(1, 4).acRatio && mid < byPQ(1, 1).acRatio + 0.02, s"ac=$mid")
  }

  test("low-acceptance settings are slower than the (1,1) baseline") {
    // The paper's ratios are 2.60X and 2.28X at full scale; at -lite scale
    // the fixed per-job cost shrinks the gap but the direction must hold.
    assert(byPQ(0.25, 1).timeRatio > 1.0, s"${byPQ(0.25, 1)}")
    assert(byPQ(1, 4).timeRatio > 1.0, s"${byPQ(1, 4)}")
  }
}
