package repro.core

import repro.pattern.Pattern

/** Theorem 3.1: the vertex-induced matches of a pattern p are exactly the
  * edge-induced matches of p' where every pair of non-adjacent regular
  * vertices of p is anti-adjacent in p'. This is how the programming model
  * expresses vertex-induced exploration (motifs) without a separate
  * exploration strategy (§3.1.3).
  */
object VertexInduced {

  /** p → p' of Theorem 3.1. Anti-vertices and existing anti-edges are kept. */
  def toEdgeInduced(p: Pattern): Pattern = {
    val reg = p.regularVertices
    val missing = for {
      i <- reg; j <- reg
      if i < j && !p.areConnected(i, j) && !p.areAntiAdjacent(i, j)
    } yield (i, j)
    missing.foldLeft(p) { case (acc, (u, v)) => acc.addAntiEdge(u, v) }
  }
}
