package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import repro.{PropHelpers, TestGraphs}

/** CSR storage invariants (paper §IV-C network storage). */
class CSRGraphSpec extends AnyFunSuite with PropHelpers {

  private val g = TestGraphs.trianglePendant

  test("node and edge counts") {
    assert(g.numNodes == 4)
    assert(g.numDirectedEdges == 8)
    assert(g.numUndirectedEdges == 4)
  }

  test("degrees match the undirected construction") {
    assert(g.degree(0) == 3)
    assert(g.degree(1) == 2)
    assert(g.degree(2) == 2)
    assert(g.degree(3) == 1)
  }

  test("offsets are a prefix sum of degrees") {
    assert(g.offsets.toSeq == Seq(0, 3, 5, 7, 8))
  }

  test("adjacency slices are sorted by destination") {
    for (v <- 0 until g.numNodes) {
      val slice = (g.offset(v) until g.offset(v) + g.degree(v)).map(g.dst)
      assert(slice == slice.sorted, s"node $v")
    }
  }

  test("weights stay aligned with their edges after sorting") {
    // 0's neighbors sorted: 1 (w=1.0), 2 (w=2.0), 3 (w=0.5)
    val lo = g.offset(0)
    assert((g.dst(lo), g.weight(lo)) == ((1, 1.0f)))
    assert((g.dst(lo + 1), g.weight(lo + 1)) == ((2, 2.0f)))
    assert((g.dst(lo + 2), g.weight(lo + 2)) == ((3, 0.5f)))
  }

  test("symmetrization: both directions exist with the same weight") {
    for (v <- 0 until g.numNodes; j <- 0 until g.degree(v)) {
      val e = g.offset(v) + j
      val u = g.dst(e)
      val back = g.neighborIndexOf(u, v)
      assert(back >= 0, s"missing reverse edge ($u,$v)")
      assert(g.weight(g.offset(u) + back) == g.weight(e))
    }
  }

  test("neighborIndexOf finds existing neighbors") {
    assert(g.neighborIndexOf(0, 2) == 1)
    assert(g.neighborIndexOf(3, 0) == 0)
  }

  test("neighborIndexOf returns -1 for non-edges") {
    assert(g.neighborIndexOf(1, 3) == -1)
    assert(g.neighborIndexOf(3, 3) == -1)
  }

  test("hasEdge mirrors neighborIndexOf") {
    assert(g.hasEdge(0, 3))
    assert(!g.hasEdge(2, 3))
  }

  test("staticWeightSum sums the neighborhood weights") {
    assert(math.abs(g.staticWeightSum(0) - 3.5) < 1e-6)
    assert(math.abs(g.staticWeightSum(3) - 0.5) < 1e-6)
  }

  test("homogeneous graph reports a single type everywhere") {
    assert(!g.isHeterogeneous)
    assert(g.nodeType(2) == 0)
    assert(g.neighborTypeCount(0, 0) == 3)
    assert(g.neighborTypeCount(0, 1) == 0)
  }

  test("heterogeneous type counts per neighborhood") {
    val t = TestGraphs.typedGraph
    assert(t.isHeterogeneous)
    // N(0) = {1,2,3,4,5} with types {1,2,0,1,2}
    assert(t.neighborTypeCount(0, 0) == 1)
    assert(t.neighborTypeCount(0, 1) == 2)
    assert(t.neighborTypeCount(0, 2) == 2)
  }

  test("edgeType encodes the ordered node-type pair") {
    val t = TestGraphs.typedGraph
    val e = t.offset(0) + t.neighborIndexOf(0, 5) // 0 (type 0) -> 5 (type 2)
    assert(t.edgeType(0, e) == 0 * 3 + 2)
  }

  test("isolated nodes have zero degree and are allowed") {
    val iso = CSRGraph.fromUndirectedEdges(3, Array(0), Array(1), Array(1.0f))
    assert(iso.degree(2) == 0)
    assert(iso.numNodes == 3)
  }

  test("meanDegree and maxDegree") {
    assert(math.abs(g.meanDegree - 2.0) < 1e-9)
    assert(g.maxDegree == 3)
  }

  test("storageBytes counts offsets, neighbors, weights") {
    assert(g.storageBytes == 4L * 5 + 4L * 8 + 4L * 8)
  }

  test("fromEdges rejects misaligned arrays") {
    assertThrows[IllegalArgumentException] {
      CSRGraph.fromEdges(2, Array(0), Array(1, 0), Array(1.0f))
    }
  }

  test("multigraph: duplicate edges are preserved") {
    val m = CSRGraph.fromUndirectedEdges(2, Array(0, 0), Array(1, 1), Array(1.0f, 2.0f))
    assert(m.degree(0) == 2)
    assert(m.degree(1) == 2)
  }

  test("property: CSR preserves every input edge (random edge lists)") {
    val edgeGen = for {
      n <- Gen.choose(2, 30)
      m <- Gen.choose(1, 80)
      es <- Gen.listOfN(m, for {
        u <- Gen.choose(0, n - 1); v <- Gen.choose(0, n - 1) if u != v
        w <- Gen.choose(1, 100)
      } yield (math.min(u, v), math.max(u, v), w.toDouble))
    } yield (n, es.distinctBy(t => (t._1, t._2)))
    forAllSamples(edgeGen) { case (n, es) =>
      val g = GraphGen.fromTriples(n, es)
      assert(g.numDirectedEdges == 2 * es.size)
      es.foreach { case (u, v, w) =>
        val i = g.neighborIndexOf(u, v)
        assert(i >= 0)
        assert(g.weight(g.offset(u) + i) == w.toFloat)
        assert(g.hasEdge(v, u))
      }
      // Degrees sum to directed edge count.
      assert((0 until n).map(g.degree).sum == g.numDirectedEdges)
    }
  }
}
