package repro.plan

import repro.pattern.{Automorphism, Pattern}

/** Symmetry breaking via partial orders (§4.1, after Grochow–Kellis [16]).
  *
  * Produces a set of ordering constraints (a, b) — meaning the data vertex
  * matched to pattern vertex `a` must be smaller than the one matched to
  * `b` — such that the only automorphisms consistent with the constraints
  * act as the identity on the '''regular''' vertices. Matches that satisfy
  * the constraints are then exactly the canonical representatives of each
  * automorphism class, so no per-match canonicality check is ever needed.
  *
  * Anti-vertices participate in automorphism computation (§4.3: they break
  * symmetries — see the pₑ example) but never receive ordering constraints
  * themselves, because they are never matched to data vertices; it is enough
  * to quotient out the automorphisms' action on regular vertices.
  */
object SymmetryBreaking {

  /** Ordering constraints (a, b) ⇒ m(a) < m(b). */
  def partialOrders(p: Pattern): Seq[(Int, Int)] = {
    var autos = Automorphism.all(p)
    val regular = p.regularVertices.toSet
    val conds = collection.mutable.ArrayBuffer.empty[(Int, Int)]
    // Iterate until every remaining automorphism fixes all regular vertices.
    while (autos.exists(sigma => regular.exists(v => sigma(v) != v))) {
      // Smallest regular vertex with a non-trivial orbit, for determinism.
      val v = p.regularVertices
        .find(v => autos.exists(sigma => sigma(v) != v))
        .getOrElse(throw new IllegalStateException("non-trivial automorphism without movable regular vertex"))
      val orbit = autos.map(_(v)).toSet - v
      // Orbits are label/kind-pure, so orbit members of a regular vertex are regular.
      for (w <- orbit.toSeq.sorted) conds += ((v, w))
      autos = autos.filter(sigma => sigma(v) == v)
    }
    conds.toSeq
  }

  /** Transitive closure of the ordering constraints, as a set of (a, b)
    * pairs with a ordered strictly before b. The matching engine uses this
    * to decide which vertex pairs still need explicit ≠ predicates.
    */
  def closure(conds: Seq[(Int, Int)]): Set[(Int, Int)] = {
    var edges = conds.toSet
    var changed = true
    while (changed) {
      val next = edges ++ (for {
        (a, b) <- edges; (c, d) <- edges if b == c
      } yield (a, d))
      changed = next.size != edges.size
      edges = next
    }
    edges
  }

  /** Whether the assignment order `vs(i) = position of pattern vertex` is
    * consistent: helper used by tests and by matching-order enumeration.
    */
  def respects(conds: Seq[(Int, Int)], rank: Map[Int, Int]): Boolean =
    conds.forall { case (a, b) =>
      !rank.contains(a) || !rank.contains(b) || rank(a) < rank(b)
    }
}
