package repro.pattern

import org.scalatest.funsuite.AnyFunSuite

class PatternsGenSpec extends AnyFunSuite {

  test("generateClique shapes") {
    for (k <- 2 to 6) {
      val p = Patterns.generateClique(k)
      assert(p.numVertices == k)
      assert(p.edges.size == k * (k - 1) / 2)
    }
  }

  test("generateClique(1) is a singleton") {
    assert(Patterns.generateClique(1).numVertices == 1)
  }

  test("generateStar has a center of full degree") {
    for (k <- 1 to 5) {
      val p = Patterns.generateStar(k)
      assert(p.numVertices == k + 1)
      assert(p.degree(1) == k)
      assert((2 to k + 1).forall(p.degree(_) == 1))
    }
  }

  test("generateChain is a path") {
    for (k <- 2 to 6) {
      val p = Patterns.generateChain(k)
      assert(p.numVertices == k)
      assert(p.edges.size == k - 1)
      assert(p.vertices.count(p.degree(_) == 1) == 2)
    }
  }

  test("generateAllVertexInduced counts match connected-graph counts") {
    // OEIS A001349: connected graphs on n nodes: 1, 1, 2, 6, 21.
    assert(Patterns.generateAllVertexInduced(1).size == 1)
    assert(Patterns.generateAllVertexInduced(2).size == 1)
    assert(Patterns.generateAllVertexInduced(3).size == 2)
    assert(Patterns.generateAllVertexInduced(4).size == 6)
    assert(Patterns.generateAllVertexInduced(5).size == 21)
  }

  test("generateAllVertexInduced(3) is wedge and triangle") {
    val keys = Patterns.generateAllVertexInduced(3).map(CanonicalForm.key).toSet
    assert(keys.contains(CanonicalForm.key(Patterns.generateChain(3))))
    assert(keys.contains(CanonicalForm.key(Patterns.generateClique(3))))
  }

  test("generateAllVertexInduced patterns are connected with the right size") {
    for (k <- 2 to 5; p <- Patterns.generateAllVertexInduced(k)) {
      assert(p.numVertices == k)
      assert(p.isConnected)
      assert(p.antiEdges.isEmpty)
    }
  }

  test("generateAllEdgeInduced counts") {
    // Connected graphs with exactly k edges, no isolated vertices:
    // k=1: edge; k=2: wedge; k=3: triangle, path-4, star-3.
    assert(Patterns.generateAllEdgeInduced(1).size == 1)
    assert(Patterns.generateAllEdgeInduced(2).size == 1)
    assert(Patterns.generateAllEdgeInduced(3).size == 3)
    // k=4: path-5, star-4, chair, triangle+tail, C4 → 5 patterns.
    assert(Patterns.generateAllEdgeInduced(4).size == 5)
  }

  test("generateAllEdgeInduced patterns have exactly k edges and are connected") {
    for (k <- 1 to 4; p <- Patterns.generateAllEdgeInduced(k)) {
      assert(p.edges.size == k)
      assert(p.isConnected)
      assert(p.vertices.forall(v => p.degree(v) > 0))
    }
  }

  test("extendByEdge of a single edge yields wedge and triangle-free growth") {
    val edge = Patterns.generateChain(2)
    val ext = Patterns.extendByEdge(Seq(edge))
    // Either attach a new vertex (wedge) — the internal pair is adjacent.
    assert(ext.size == 1)
    assert(CanonicalForm.key(ext.head) == CanonicalForm.key(Patterns.generateChain(3)))
  }

  test("extendByEdge of the wedge yields the three 3-edge patterns") {
    val keys = Patterns.extendByEdge(Seq(Patterns.generateChain(3))).map(CanonicalForm.key).toSet
    val expected = Patterns.generateAllEdgeInduced(3).map(CanonicalForm.key).toSet
    assert(keys == expected)
  }

  test("extendByEdge preserves labels") {
    val p = Patterns.generateChain(2).addLabel(1, 4).addLabel(2, 9)
    val ext = Patterns.extendByEdge(Seq(p))
    assert(ext.forall(_.labels.values.toSet.subsetOf(Set(4, 9))))
    assert(ext.forall(_.labels.size == 2))
  }

  test("extendByVertex of an edge yields wedge and triangle") {
    val keys = Patterns.extendByVertex(Seq(Patterns.generateChain(2))).map(CanonicalForm.key).toSet
    assert(keys == Set(
      CanonicalForm.key(Patterns.generateChain(3)),
      CanonicalForm.key(Patterns.generateClique(3))
    ))
  }

  test("extendByVertex covers all vertex-induced patterns of the next size") {
    val from3 = Patterns.extendByVertex(Patterns.generateAllVertexInduced(3))
    val all4 = Patterns.generateAllVertexInduced(4).map(CanonicalForm.key).toSet
    assert(from3.map(CanonicalForm.key).toSet == all4)
  }

  test("parsePatterns reads edges, anti-edges and labels") {
    val ps = Patterns.parsePatterns(Seq(
      "e 1 2", "e 2 3", "l 1 5",
      "",
      "1 2", "ae 1 3"
    ))
    assert(ps.size == 2)
    assert(ps(0).areConnected(1, 2) && ps(0).getLabel(1).contains(5))
    assert(ps(1).areAntiAdjacent(1, 3))
  }

  test("loadPatterns round-trips through a file") {
    val f = java.io.File.createTempFile("patterns", ".txt")
    try {
      val w = new java.io.PrintWriter(f)
      w.println("e 1 2"); w.println("e 1 3"); w.println(); w.println("1 2")
      w.close()
      val ps = Patterns.loadPatterns(f.getAbsolutePath)
      assert(ps.size == 2)
      assert(ps(0).edges == Set((1, 2), (1, 3)))
    } finally { f.delete(); () }
  }
}
