package repro.pattern

import org.scalatest.funsuite.AnyFunSuite

class AutomorphismSpec extends AnyFunSuite {

  test("clique k has k! automorphisms") {
    for (k <- 2 to 5)
      assert(Automorphism.all(Patterns.generateClique(k)).size == (1 to k).product)
  }

  test("path automorphisms: the reversal") {
    for (k <- 2 to 5)
      assert(Automorphism.all(Patterns.generateChain(k)).size == 2)
  }

  test("star with k spokes has k! automorphisms (center fixed)") {
    for (k <- 2 to 4)
      assert(Automorphism.all(Patterns.generateStar(k)).size == (1 to k).product)
    // star(1) degenerates to a single edge, where center and spoke swap.
    assert(Automorphism.all(Patterns.generateStar(1)).size == 2)
  }

  test("4-cycle has 8 automorphisms (dihedral group)") {
    val c4 = Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 1))
    assert(Automorphism.all(c4).size == 8)
  }

  test("diamond has 4 automorphisms") {
    val diamond = Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 1), (2, 4))
    assert(Automorphism.all(diamond).size == 4)
  }

  test("labels restrict automorphisms") {
    val labeledEdge = Patterns.generateChain(2).addLabel(1, 0).addLabel(2, 1)
    assert(Automorphism.all(labeledEdge).size == 1)
    val sameLabel = Patterns.generateChain(2).addLabel(1, 0).addLabel(2, 0)
    assert(Automorphism.all(sameLabel).size == 2)
  }

  test("wildcard vertices only map to wildcards") {
    val p = Patterns.generateChain(3).addLabel(1, 5) // 1 labeled, 2-3 wildcard
    // path 1-2-3 with only endpoint 1 labeled: no symmetry remains
    assert(Automorphism.all(p).size == 1)
  }

  test("§4.3: anti-vertex breaks triangle symmetry (pe example)") {
    // pe: triangle u1,u2,u3 with anti-vertex u4 anti-adjacent to u1 and u3.
    val pe = Patterns.generateClique(3).addAntiEdge(1, 4).addAntiEdge(3, 4)
    val autos = Automorphism.all(pe)
    // u2 is fixed (not connected to the anti-vertex); u1↔u3 swap remains.
    assert(autos.size == 2)
    assert(autos.forall(s => s(2) == 2 && s(4) == 4))
    assert(autos.exists(s => s(1) == 3 && s(3) == 1))
  }

  test("anti-vertices cannot map to regular vertices") {
    val p7 = Patterns.generateClique(3).addAntiEdge(1, 4).addAntiEdge(2, 4).addAntiEdge(3, 4)
    val autos = Automorphism.all(p7)
    assert(autos.size == 6) // triangle symmetric, anti-vertex fixed
    assert(autos.forall(_(4) == 4))
  }

  test("regularMultiplicity equals |Aut| when all vertices are regular") {
    assert(Automorphism.regularMultiplicity(Patterns.generateClique(4)) == 24)
    assert(Automorphism.regularMultiplicity(Patterns.generateChain(4)) == 2)
  }

  test("regularMultiplicity quotients automorphisms moving only anti-vertices") {
    // Edge 1-2 with two symmetric anti-vertices 3, 4 anti-adjacent to both.
    val p = Patterns
      .generateChain(2)
      .addAntiEdge(1, 3).addAntiEdge(2, 3)
      .addAntiEdge(1, 4).addAntiEdge(2, 4)
    // Aut: swap(1,2) × swap(3,4) = 4; action on regular vertices: 2.
    assert(Automorphism.all(p).size == 4)
    assert(Automorphism.regularMultiplicity(p) == 2)
  }

  test("orbits of the star group the spokes") {
    val orbits = Automorphism.orbits(Patterns.generateStar(3))
    assert(orbits.toSet == Set(Set(1), Set(2, 3, 4)))
  }

  test("orbits of the diamond pair opposite vertices") {
    val diamond = Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 1), (2, 4))
    assert(Automorphism.orbits(diamond).toSet == Set(Set(1, 3), Set(2, 4)))
  }

  test("preserves rejects non-automorphisms") {
    val wedge = Patterns.generateChain(3) // 1-2-3, center 2
    assert(!Automorphism.preserves(wedge, Map(1 -> 2, 2 -> 1, 3 -> 3)))
    assert(Automorphism.preserves(wedge, Map(1 -> 3, 2 -> 2, 3 -> 1)))
  }
}
