package repro.core

import repro.graph.CSRGraph

/** The paper's sampler manager with the 2D data layout (§IV-C, Fig. 4).
  *
  * Each M-H edge sampler's whole state is one variable, LAST_x. States are
  * decomposed into *position* (current node) and *affixture* (an index
  * within that node's bucket), so looking a sampler up by state is two
  * array indexings — O(1), versus O(log #state) for a balanced tree over
  * opaque states. Buckets are allocated lazily on first touch, so memory
  * grows to at most one int per *visited* state (4 * #state bytes total).
  *
  * Instances are per-partition and single-threaded, mirroring the paper's
  * per-thread walker assignment.
  */
final class SamplerManager(g: CSRGraph, bucketSizeOf: Int => Int) {
  private val buckets = new Array[Array[Int]](g.numNodes)
  private var allocatedSlots: Long = 0L

  /** The LAST_x bucket of node v; slots start at -1 (uninitialized). */
  def bucket(v: Int): Array[Int] = {
    var b = buckets(v)
    if (b == null) {
      val n = bucketSizeOf(v)
      b = new Array[Int](n)
      java.util.Arrays.fill(b, -1)
      buckets(v) = b
      allocatedSlots += n
    }
    b
  }

  /** Bytes of LAST_x storage allocated so far (4 bytes per slot). */
  def memoryBytes: Long = 4L * allocatedSlots
}
