package repro.pattern

import org.scalatest.funsuite.AnyFunSuite

class CanonicalFormSpec extends AnyFunSuite {

  test("isomorphic relabelings share a key") {
    val p = Pattern.fromEdges((1, 2), (2, 3), (3, 4), (2, 4))
    val q = p.remap(Map(1 -> 4, 2 -> 1, 3 -> 3, 4 -> 2))
    assert(CanonicalForm.key(p) == CanonicalForm.key(q))
  }

  test("different structures get different keys") {
    assert(CanonicalForm.key(Patterns.generateChain(4)) != CanonicalForm.key(Patterns.generateStar(3)))
    assert(CanonicalForm.key(Patterns.generateClique(3)) != CanonicalForm.key(Patterns.generateChain(3)))
  }

  test("labels distinguish keys") {
    val a = Patterns.generateChain(2).addLabel(1, 0).addLabel(2, 1)
    val b = Patterns.generateChain(2).addLabel(1, 0).addLabel(2, 2)
    val c = Patterns.generateChain(2).addLabel(2, 0).addLabel(1, 1) // automorphic to a
    assert(CanonicalForm.key(a) != CanonicalForm.key(b))
    assert(CanonicalForm.key(a) == CanonicalForm.key(c))
  }

  test("anti-edges distinguish keys") {
    val plain = Patterns.generateChain(3)
    val anti = Patterns.generateChain(3).addAntiEdge(1, 3)
    assert(CanonicalForm.key(plain) != CanonicalForm.key(anti))
  }

  test("canonicalize returns an isomorphic pattern on ids 1..n") {
    val p = Pattern.fromEdges((10, 20), (20, 30), (10, 30), (30, 40))
    val (canon, perm) = CanonicalForm.canonicalize(p)
    assert(canon.vertices == Vector(1, 2, 3, 4))
    assert(canon.edges.size == p.edges.size)
    // perm really maps p onto canon
    assert(p.edges.map { case (u, v) => Pattern.norm(perm(u), perm(v)) } == canon.edges)
  }

  test("distinct dedupes automorphic relabelings") {
    val variants = Seq(
      Patterns.generateChain(3),
      Patterns.generateChain(3).remap(Map(1 -> 3, 2 -> 2, 3 -> 1)),
      Patterns.generateClique(3)
    )
    assert(CanonicalForm.distinct(variants).size == 2)
  }

  test("property: every relabeling of every 4-vertex pattern preserves the key") {
    for {
      p <- Patterns.generateAllVertexInduced(4)
      perm <- p.vertices.permutations
    } {
      val q = p.remap(p.vertices.zip(perm).toMap)
      assert(CanonicalForm.key(p) == CanonicalForm.key(q))
    }
  }

  test("codec round-trips patterns") {
    val samples = Seq(
      Patterns.generateClique(4),
      Patterns.generateChain(3).addAntiEdge(1, 3).addLabel(2, 9),
      Pattern.singleton(),
      Patterns.generateClique(3).addAntiEdge(1, 4).addAntiEdge(2, 4).addAntiEdge(3, 4)
    )
    for (p <- samples)
      assert(PatternCodec.decode(PatternCodec.encode(p)) == p)
  }

  test("codec keys are stable strings") {
    assert(PatternCodec.encode(Patterns.generateChain(3)) == "1,2,3|1-2,2-3||")
  }
}
