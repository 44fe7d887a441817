package repro.apps

import repro.core.{MatchEngine, VertexInduced}
import repro.graph.DataGraph
import repro.pattern.{Pattern, Patterns}

/** Motif counting (Fig 4e): counts of every connected vertex-induced
  * pattern with `size` vertices. Vertex-induced semantics are obtained via
  * Theorem 3.1 (anti-edges), so one engine serves both match kinds.
  */
object MotifCount {

  /** (motif pattern, canonical vertex-induced count) for all motifs of `size`. */
  def count(g: DataGraph, size: Int, symmetry: Boolean = true): Seq[(Pattern, Long)] =
    Patterns.generateAllVertexInduced(size).map { p =>
      p -> MatchEngine.countMatches(g, VertexInduced.toEdgeInduced(p), symmetry)
    }

  /** Total number of connected induced `size`-subgraphs (sum over motifs). */
  def total(g: DataGraph, size: Int, symmetry: Boolean = true): Long =
    count(g, size, symmetry).map(_._2).sum
}
