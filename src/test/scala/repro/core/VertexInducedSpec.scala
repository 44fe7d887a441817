package repro.core

import repro.{Check, LocalRef, SparkSpec, TestGraphs}
import repro.pattern.{Pattern, Patterns}

/** Theorem 3.1 and vertex-induced matching. */
class VertexInducedSpec extends SparkSpec {

  private lazy val erEdges = TestGraphs.er(35, 100, seed = 31)
  private lazy val er = TestGraphs.dataGraph(spark, erEdges)

  test("toEdgeInduced adds anti-edges between all non-adjacent regular pairs") {
    val wedge = Patterns.generateChain(3)
    val vi = VertexInduced.toEdgeInduced(wedge)
    assert(vi.antiEdges == Set((1, 3)))
    val c4 = Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 1))
    assert(VertexInduced.toEdgeInduced(c4).antiEdges == Set((1, 3), (2, 4)))
  }

  test("toEdgeInduced leaves cliques unchanged") {
    val k4 = Patterns.generateClique(4)
    assert(VertexInduced.toEdgeInduced(k4) == k4)
  }

  test("toEdgeInduced ignores anti-vertices") {
    val p = Patterns.generateChain(3).addAntiEdge(2, 4)
    val vi = VertexInduced.toEdgeInduced(p)
    // Only the regular pair (1,3) gains an anti-edge; the anti-vertex keeps
    // exactly its original anti-adjacency.
    assert(vi.antiEdges == Set((1, 3), (2, 4)))
  }

  test("vertex-induced counts vs oracle for all size-3 and size-4 motifs") {
    for (k <- 3 to 4; p <- Patterns.generateAllVertexInduced(k))
      Check.engineVsOracle(spark, er, VertexInduced.toEdgeInduced(p))
  }

  test("identity: edge-induced wedges = vertex-induced wedges + 3 · triangles") {
    val wedgesEI = MatchEngine.countMatches(er, Patterns.generateChain(3))
    val wedgesVI = MatchEngine.countMatches(er, VertexInduced.toEdgeInduced(Patterns.generateChain(3)))
    val triangles = MatchEngine.countMatches(er, Patterns.generateClique(3))
    assert(wedgesEI == wedgesVI + 3 * triangles)
  }

  test("identity: sum of vertex-induced 3-motifs = number of connected 3-sets") {
    val ref = LocalRef.graph(erEdges)
    val total = Patterns.generateAllVertexInduced(3)
      .map(p => MatchEngine.countMatches(er, VertexInduced.toEdgeInduced(p)))
      .sum
    // Count connected 3-subsets locally.
    val vs = ref.vertices
    val connected3 = vs.combinations(3).count { c =>
      val pairs = Seq((c(0), c(1)), (c(0), c(2)), (c(1), c(2))).count { case (a, b) => ref.connected(a, b) }
      pairs >= 2
    }
    assert(total == connected3)
  }

  test("vertex-induced matches of the diamond vs local reference") {
    val diamond = Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 1), (2, 4))
    val vi = VertexInduced.toEdgeInduced(diamond)
    assert(MatchEngine.countMatches(er, vi) == LocalRef.canonicalCount(vi, LocalRef.graph(erEdges)))
  }
}
