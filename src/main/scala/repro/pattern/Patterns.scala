package repro.pattern

import scala.io.Source

/** Pattern construction API of Fig 2: loading ([L1]), exhaustive generation
  * ([G1]/[G2]), special patterns ([S1]–[S3]) and stepwise extension
  * ([C1]/[C2]). All generators return patterns deduplicated up to
  * isomorphism with canonical vertex ids 1..n.
  */
object Patterns {

  /** [L1] Load patterns from a text file. Patterns are blank-line-separated
    * blocks of lines:
    * {{{
    *   e u v    // regular edge   (also accepted: "u v")
    *   ae u v   // anti-edge
    *   l u x    // label x on vertex u
    * }}}
    */
  def loadPatterns(filename: String): Seq[Pattern] = {
    val src = Source.fromFile(filename)
    try parsePatterns(src.getLines().toSeq)
    finally src.close()
  }

  /** Parse the [L1] text format from pre-split lines (used by tests). */
  def parsePatterns(lines: Seq[String]): Seq[Pattern] = {
    val blocks = lines
      .foldLeft(List(List.empty[String])) { (acc, line) =>
        if (line.trim.isEmpty) List.empty[String] :: acc
        else (line.trim :: acc.head) :: acc.tail
      }
      .map(_.reverse)
      .reverse
      .filter(_.nonEmpty)
    blocks.map(parseBlock)
  }

  private def parseBlock(block: Seq[String]): Pattern =
    block.foldLeft(Pattern(Vector.empty, Set.empty, Set.empty, Map.empty)) { (p, line) =>
      line.split("\\s+").toList match {
        case "e" :: u :: v :: Nil  => p.addEdge(u.toInt, v.toInt)
        case "ae" :: u :: v :: Nil => p.addAntiEdge(u.toInt, v.toInt)
        case "l" :: u :: x :: Nil  => p.addLabel(u.toInt, x.toInt)
        case u :: v :: Nil         => p.addEdge(u.toInt, v.toInt)
        case other                 => throw new IllegalArgumentException(s"bad pattern line: $line ($other)")
      }
    }

  /** [S1] k-clique: complete graph on `size` vertices. */
  def generateClique(size: Int): Pattern = {
    require(size >= 1)
    if (size == 1) Pattern.singleton()
    else Pattern.fromEdges((for (i <- 1 to size; j <- (i + 1) to size) yield (i, j)): _*)
  }

  /** [S2] star with `size` spokes: center vertex 1 joined to `size` endpoints. */
  def generateStar(size: Int): Pattern = {
    require(size >= 1)
    Pattern.fromEdges((2 to size + 1).map(i => (1, i)): _*)
  }

  /** [S3] chain (path) on `size` vertices. */
  def generateChain(size: Int): Pattern = {
    require(size >= 1)
    if (size == 1) Pattern.singleton()
    else Pattern.fromEdges((1 until size).map(i => (i, i + 1)): _*)
  }

  /** [G2] All connected unlabeled patterns with exactly `size` vertices,
    * up to isomorphism (2 for size 3, 6 for size 4, 21 for size 5 — these
    * are the motif pattern sets of §2.1).
    */
  def generateAllVertexInduced(size: Int): Seq[Pattern] = {
    require(size >= 1 && size <= 6, "vertex-induced generation supported up to 6 vertices")
    if (size == 1) return Seq(Pattern.singleton())
    val allPairs = (for (i <- 1 to size; j <- (i + 1) to size) yield (i, j)).toVector
    val candidates =
      allPairs.toSet.subsets
        .filter(_.size >= size - 1) // connectivity needs at least a spanning tree
        .map(es => Pattern(Vector.range(1, size + 1), es, Set.empty, Map.empty))
        .filter(_.isConnected)
    CanonicalForm.distinct(candidates.toSeq)
  }

  /** [G1] All connected unlabeled patterns with exactly `size` edges (and no
    * isolated vertices), up to isomorphism. E.g. size 2 → the wedge; size 3
    * → triangle, 4-chain and 3-star (the FSM seed sets of §3.2.1).
    */
  def generateAllEdgeInduced(size: Int): Seq[Pattern] = {
    require(size >= 1 && size <= 7, "edge-induced generation supported up to 7 edges")
    val maxV = size + 1
    val allPairs = (for (i <- 1 to maxV; j <- (i + 1) to maxV) yield (i, j)).toVector
    val candidates = allPairs
      .combinations(size)
      .map(es => Pattern.fromEdges(es: _*))
      .filter(p => p.isConnected && p.edges.size == size)
    CanonicalForm.distinct(candidates.toSeq)
  }

  /** [C1] All unique patterns obtained by extending any input pattern with
    * one regular edge: either between two existing non-adjacent regular
    * vertices, or to one new (unlabeled) vertex. This is the FSM extension
    * step of Fig 4a; labels of existing vertices are preserved.
    */
  def extendByEdge(patterns: Iterable[Pattern]): Seq[Pattern] = {
    val out = patterns.flatMap { p =>
      val reg = p.regularVertices
      val internal = for {
        i <- reg; j <- reg
        if i < j && !p.areConnected(i, j) && !p.areAntiAdjacent(i, j)
      } yield p.addEdge(i, j)
      val fresh = p.vertices.maxOption.getOrElse(0) + 1
      val external = reg.map(v => p.addEdge(v, fresh))
      internal ++ external
    }
    CanonicalForm.distinct(out)
  }

  /** [C2] All unique patterns obtained by extending any input pattern with
    * one new (unlabeled) vertex connected to a non-empty subset of the
    * existing regular vertices — the vertex-induced analogue of [C1].
    */
  def extendByVertex(patterns: Iterable[Pattern]): Seq[Pattern] = {
    val out = patterns.flatMap { p =>
      val reg = p.regularVertices
      val fresh = p.vertices.maxOption.getOrElse(0) + 1
      reg.toSet.subsets
        .filter(_.nonEmpty)
        .map(sub => sub.foldLeft(p)((acc, v) => acc.addEdge(v, fresh)))
    }
    CanonicalForm.distinct(out)
  }
}
