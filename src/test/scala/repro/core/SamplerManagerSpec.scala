package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.TestGraphs

/** 2D data layout (§IV-C, Fig. 4): lazy buckets, O(1) lookup semantics. */
class SamplerManagerSpec extends AnyFunSuite {
  private val g = TestGraphs.trianglePendant

  test("buckets allocate lazily and start uninitialized (-1)") {
    val mgr = new SamplerManager(g, v => g.degree(v) + 1)
    assert(mgr.memoryBytes == 0)
    val b = mgr.bucket(0)
    assert(b.length == g.degree(0) + 1)
    assert(b.forall(_ == -1))
    assert(mgr.memoryBytes == 4L * (g.degree(0) + 1))
  }

  test("repeated lookups return the same bucket instance") {
    val mgr = new SamplerManager(g, _ => 3)
    val b1 = mgr.bucket(2)
    b1(1) = 42
    assert(mgr.bucket(2)(1) == 42)
    assert(mgr.bucket(2) eq b1)
    assert(mgr.memoryBytes == 12L) // allocated once
  }

  test("memory grows by bucket size per distinct position") {
    val mgr = new SamplerManager(g, v => g.degree(v))
    (0 until g.numNodes).foreach(mgr.bucket)
    assert(mgr.memoryBytes == 4L * g.numDirectedEdges)
  }

  test("bucket sizes follow the provided layout function") {
    val mgr = new SamplerManager(g, v => 2 * v + 1)
    assert(mgr.bucket(3).length == 7)
  }
}
