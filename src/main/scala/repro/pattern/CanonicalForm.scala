package repro.pattern

/** Canonical forms for small patterns.
  *
  * Two patterns are isomorphic (respecting edge kinds and labels, wildcards
  * included) iff their canonical keys are equal. Used to deduplicate
  * dynamically generated patterns (Fig 2 [G1]/[G2]/[C1]/[C2]) and to key
  * motif / FSM aggregations.
  *
  * Brute force over vertex permutations — patterns have ≤ ~7 vertices, and
  * the paper itself computes exploration plans "often in less than half a
  * millisecond", so there is no need for nauty-style refinement here.
  */
object CanonicalForm {

  /** Stable string key identifying `p` up to isomorphism. */
  def key(p: Pattern): String = canonicalize(p)._1.toString

  /** Canonical representative of `p` (vertices renamed 1..n) and the
    * renaming permutation (original vertex → canonical position).
    */
  def canonicalize(p: Pattern): (Pattern, Map[Int, Int]) = {
    val vs = p.vertices
    val n = vs.size
    var best: Pattern = null
    var bestPerm: Map[Int, Int] = null
    var bestStr: String = null
    for (perm <- vs.permutations) {
      // vertex vs(i) gets canonical id (position of vs(i) in perm) + 1
      val pos = perm.zipWithIndex.map { case (v, i) => v -> (i + 1) }.toMap
      val cand = p.remap(pos)
      val s = cand.toString
      if (bestStr == null || s < bestStr) { best = cand; bestPerm = pos; bestStr = s }
    }
    if (best == null) (p, Map.empty) else (best, bestPerm)
  }

  /** Deduplicate a collection of patterns up to isomorphism, keeping the
    * canonical representative of each class (deterministic order).
    */
  def distinct(ps: Iterable[Pattern]): Seq[Pattern] =
    ps.map(p => canonicalize(p)._1)
      .groupBy(_.toString)
      .toSeq
      .sortBy(_._1)
      .map(_._2.head)
}
