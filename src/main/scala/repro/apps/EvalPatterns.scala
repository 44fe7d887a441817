package repro.apps

import repro.pattern.Pattern

/** The evaluation patterns of Fig 9 and Table 6.
  *
  * Fig 9 is an image in the paper, so the exact shapes of p1–p6 are not
  * recoverable from the text; per DESIGN.md we substitute six representative
  * 4–5-vertex patterns spanning the same difficulty range (covering the
  * Fractal and G-Miner pattern workloads, as the paper's selection did).
  * p2 is labeled, matching the paper's G-Miner comparison setup. p7 and p8
  * ARE described in the text (§6.5) and are built exactly as described.
  */
object EvalPatterns {

  /** p1: diamond — 4-cycle with one chord (the running example of Fig 6). */
  val p1: Pattern = Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 1), (2, 4))

  /** p2 (unlabeled shape): tailed triangle. */
  val p2Shape: Pattern = Pattern.fromEdges((1, 2), (2, 3), (1, 3), (3, 4))

  /** p2 with synthetic labels 0–5 (paper: "integers 1-6 with uniform
    * probability" on unlabeled graphs; our labels are 0-based).
    */
  val p2: Pattern = p2Shape.addLabel(1, 0).addLabel(2, 1).addLabel(3, 2).addLabel(4, 3)

  /** p3: 4-clique with a pendant vertex. */
  val p3: Pattern = Pattern.fromEdges((1, 2), (1, 3), (1, 4), (2, 3), (2, 4), (3, 4), (4, 5))

  /** p4: house — 5-cycle with one chord. */
  val p4: Pattern = Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 5), (5, 1), (2, 5))

  /** p5: bowtie — two triangles sharing a vertex. */
  val p5: Pattern = Pattern.fromEdges((1, 2), (1, 3), (2, 3), (3, 4), (3, 5), (4, 5))

  /** p6: near-5-clique — K5 minus one edge. */
  val p6: Pattern = Pattern.fromEdges(
    (1, 2), (1, 3), (1, 4), (1, 5), (2, 3), (2, 4), (2, 5), (3, 4), (3, 5))

  /** p7 (§6.5): maximal triangle — a triangle with a fully-connected
    * anti-vertex, i.e. triangles not contained in any 4-clique.
    */
  val p7: Pattern = Pattern
    .fromEdges((1, 2), (1, 3), (2, 3))
    .addAntiEdge(1, 4)
    .addAntiEdge(2, 4)
    .addAntiEdge(3, 4)

  /** p8 (§6.5): vertex-induced chordal square — a 4-cycle with chord (1,3)
    * whose other diagonal (2,4) is an anti-edge.
    */
  val p8: Pattern = Pattern
    .fromEdges((1, 2), (2, 3), (3, 4), (4, 1), (1, 3))
    .addAntiEdge(2, 4)

  /** The Table 4 pattern-matching workload. */
  val numbered: Seq[(String, Pattern)] =
    Seq("p1" -> p1, "p2" -> p2, "p3" -> p3, "p4" -> p4, "p5" -> p5, "p6" -> p6)
}
