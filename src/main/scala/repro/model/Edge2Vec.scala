package repro.model

import repro.core.{RandomWalkModel, WalkState}
import repro.graph.CSRGraph

/** Edge2vec (Eq. 3): node2vec extended with an edge-type transition matrix
  * M on heterogeneous networks. The dynamic weight of a candidate edge
  * (v, u) under state (s, v) is
  *     alpha_u * M(Phi(s,v), Phi(v,u)) * w_vu,
  * with alpha as in node2vec. Edge types are ordered node-type pairs
  * (CSRGraph.edgeType), so M is (T^2 x T^2). The first step has no
  * previous edge; the M factor and alpha are then 1.
  *
  * The paper learns M by EM in the original edge2vec; here M is a fixed
  * deterministic stochastic-ish matrix ([[Edge2Vec.defaultMatrix]]) — the
  * sampling cost and distribution shape only depend on M's value range,
  * not on how it was fit (DESIGN.md §3).
  */
final class Edge2Vec(val p: Double, val q: Double, val matrix: Array[Array[Double]])
    extends RandomWalkModel {
  require(p > 0 && q > 0, "edge2vec requires p > 0 and q > 0")
  require(matrix.nonEmpty && matrix.forall(_.length == matrix.length), "M must be square")
  override val name = s"edge2vec(p=$p,q=$q)"
  override val isSecondOrder = true

  private val invP = 1.0 / p
  private val invQ = 1.0 / q
  private val mMax = matrix.map(_.max).max
  private val mMin = matrix.map(_.min).min

  private def alpha(g: CSRGraph, s: WalkState, e: Int): Double = {
    if (s.prev < 0) 1.0
    else {
      val u = g.dst(e)
      if (u == s.prev) invP
      else if (g.hasEdge(s.prev, u)) 1.0
      else invQ
    }
  }

  /** M factor for traversing edge `e` after having arrived via (s.prev, s.cur). */
  def mFactor(g: CSRGraph, s: WalkState, e: Int): Double =
    if (s.prev < 0) 1.0
    else {
      val prevType = g.nodeType(s.prev) * g.numTypes + g.nodeType(s.cur)
      matrix(prevType)(g.edgeType(s.cur, e))
    }

  override def calculateWeight(g: CSRGraph, s: WalkState, e: Int): Double =
    alpha(g, s, e) * mFactor(g, s, e) * g.weight(e)

  override def updateState(g: CSRGraph, s: WalkState, e: Int): WalkState =
    WalkState(s.cur, g.dst(e), 0)

  override def initialState(g: CSRGraph, start: Int): WalkState = WalkState(-1, start, 0)

  override def bucketSize(g: CSRGraph, v: Int): Int = g.degree(v) + 1
  override def affixture(g: CSRGraph, s: WalkState): Int =
    if (s.prev < 0) g.degree(s.cur)
    else {
      val i = g.neighborIndexOf(s.cur, s.prev)
      if (i >= 0) i else g.degree(s.cur)
    }

  override def stateFor(g: CSRGraph, v: Int, affix: Int): WalkState =
    if (affix >= g.degree(v)) WalkState(-1, v, 0)
    else WalkState(g.dst(g.offset(v) + affix), v, 0)

  override val maxBias: Double = math.max(1.0, math.max(invP, invQ)) * mMax
  override val minBias: Double = math.min(1.0, math.min(invP, invQ)) * mMin
  // No deterministic outlier: the M factor depends on the heterogeneous
  // type layout, so outlier folding cannot be predefined (paper §V-E).
}

object Edge2Vec {
  /** Deterministic dense transition matrix over T^2 edge types with
    * entries in [0.2, 1.0] — positive everywhere so every edge stays
    * reachable, skewed enough to exercise the samplers.
    */
  def defaultMatrix(numTypes: Int): Array[Array[Double]] = {
    val n = numTypes * numTypes
    Array.tabulate(n, n)((i, j) => 0.2 + 0.8 * (((i * 7 + j * 13) % 10) / 10.0))
  }

  def apply(p: Double, q: Double, numTypes: Int = 3): Edge2Vec =
    new Edge2Vec(p, q, defaultMatrix(numTypes))
}
