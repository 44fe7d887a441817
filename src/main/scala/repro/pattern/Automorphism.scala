package repro.pattern

/** Automorphism enumeration for (small) patterns.
  *
  * An automorphism is a permutation of the pattern's vertices that preserves
  * regular edges, anti-edges, and labels. Because anti-edges are a distinct
  * edge kind, a regular vertex can never map to an anti-vertex — this is
  * exactly the §4.3 requirement that the symmetry-breaking algorithm "treats
  * the anti-edges of an anti-vertex differently than regular edges when
  * computing automorphisms".
  *
  * Unlabeled (wildcard) vertices form their own label class: a wildcard can
  * only map to a wildcard. Patterns are tiny (≤ ~7 vertices), so brute-force
  * permutation enumeration is both the simplest and a perfectly adequate
  * ground truth.
  */
object Automorphism {

  /** All automorphisms of `p`, as vertex→vertex maps (identity included). */
  def all(p: Pattern): Seq[Map[Int, Int]] = {
    val vs = p.vertices
    vs.permutations.toSeq
      .map(perm => vs.zip(perm).toMap)
      .filter(sigma => preserves(p, sigma))
  }

  /** Whether permutation `sigma` preserves `p`'s structure and labels. */
  def preserves(p: Pattern, sigma: Map[Int, Int]): Boolean = {
    def mapped(es: Set[(Int, Int)]): Set[(Int, Int)] =
      es.map { case (u, v) => Pattern.norm(sigma(u), sigma(v)) }
    mapped(p.edges) == p.edges &&
    mapped(p.antiEdges) == p.antiEdges &&
    p.vertices.forall(v => p.getLabel(v) == p.getLabel(sigma(v)))
  }

  /** Number of distinct actions of Aut(p) on the regular vertices.
    *
    * This is the over-counting multiplicity a system without symmetry
    * breaking incurs (PRG-U / AutoMine model, §6.6): every canonical match
    * is discovered once per distinct regular-vertex action. Automorphisms
    * that only permute anti-vertices do not duplicate matches, hence the
    * restriction to regular vertices.
    */
  def regularMultiplicity(p: Pattern): Int = {
    val reg = p.regularVertices
    all(p).map(sigma => reg.map(sigma)).distinct.size
  }

  /** Orbits of the vertex set under the full automorphism group. */
  def orbits(p: Pattern): Seq[Set[Int]] = orbitsOf(p.vertices, all(p))

  /** Orbits of `vs` under an explicit set of automorphisms. */
  def orbitsOf(vs: Seq[Int], autos: Seq[Map[Int, Int]]): Seq[Set[Int]] = {
    val remaining = collection.mutable.LinkedHashSet(vs: _*)
    val out = collection.mutable.ArrayBuffer.empty[Set[Int]]
    while (remaining.nonEmpty) {
      val v = remaining.head
      val orbit = autos.map(_(v)).toSet
      out += orbit
      remaining --= orbit
    }
    out.toSeq
  }
}
