package repro.apps

import repro.core.MatchEngine
import repro.graph.DataGraph
import repro.pattern.Patterns

/** k-clique counting (Fig 4c). A clique's edge- and vertex-induced matches
  * coincide (it is complete), so no anti-edges are needed.
  */
object CliqueCount {
  def count(g: DataGraph, k: Int, symmetry: Boolean = true): Long =
    MatchEngine.countMatches(g, Patterns.generateClique(k), symmetry)
}
