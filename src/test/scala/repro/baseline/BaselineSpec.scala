package repro.baseline

import repro.{Check, SparkSpec, TestGraphs}
import repro.apps.{EvalPatterns, MotifCount}
import repro.core.{MatchEngine, MniSupport}
import repro.graph.DataGraph
import repro.pattern.Patterns

/** The pattern-unaware baselines must produce the SAME results as the
  * engine (they are correct, just wasteful); their instrumentation must
  * exhibit the Fig 1 blowup shape.
  */
class BaselineSpec extends SparkSpec {

  private lazy val edges = TestGraphs.er(35, 100, seed = 91)
  private lazy val g: DataGraph = TestGraphs.dataGraph(spark, edges)
  private lazy val labEdges = TestGraphs.er(30, 80, seed = 92)
  private lazy val labels = TestGraphs.labels(30, 3, seed = 93)
  private lazy val lg: DataGraph = TestGraphs.dataGraph(spark, labEdges, labels)

  private def engineMotifKeys(size: Int): Map[String, Long] =
    MotifCount.count(g, size).filter(_._2 > 0).map { case (p, n) => (Check.key(p), n) }.toMap

  test("BFS (Arabesque mode) 3-motif counts equal the engine's") {
    val (counts, profile) = BfsEnumerator.motifCounts(spark, g, 3, rstream = false)
    assert(counts == engineMotifKeys(3))
    assert(profile.explored >= counts.values.sum)
    assert(profile.canonicality > 0 && profile.isomorphism > 0)
  }

  test("BFS (RStream mode) 3-motif counts equal the engine's") {
    val (counts, profile) = BfsEnumerator.motifCounts(spark, g, 3, rstream = true)
    assert(counts == engineMotifKeys(3))
    assert(profile.explored >= counts.values.sum)
  }

  test("RStream mode explores at least as much as Arabesque mode (ordering blowup)") {
    val (_, abq) = BfsEnumerator.motifCounts(spark, g, 3, rstream = false)
    val (_, rs) = BfsEnumerator.motifCounts(spark, g, 3, rstream = true)
    assert(rs.explored >= abq.explored)
  }

  test("BFS 4-motif counts equal the engine's") {
    val (counts, _) = BfsEnumerator.motifCounts(spark, g, 4, rstream = false)
    assert(counts == engineMotifKeys(4))
  }

  test("BFS clique counts equal the engine's, in both modes") {
    for (rstream <- Seq(false, true); k <- 3 to 4) {
      val (n, profile) = BfsEnumerator.cliqueCount(spark, g, k, rstream)
      assert(n == MatchEngine.countMatches(g, Patterns.generateClique(k)), s"k=$k rstream=$rstream")
      assert(profile.explored >= n)
    }
  }

  test("DFS (Fractal mode) motif counts equal the engine's") {
    val (c3, p3) = DfsEnumerator.motifCounts(spark, g, 3)
    assert(c3 == engineMotifKeys(3))
    assert(p3.explored > 0 && p3.isomorphism > 0)
    val (c4, _) = DfsEnumerator.motifCounts(spark, g, 4)
    assert(c4 == engineMotifKeys(4))
  }

  test("DFS clique counts equal the engine's with zero isomorphism checks (native)") {
    for (k <- 3 to 5) {
      val (n, profile) = DfsEnumerator.cliqueCount(spark, g, k)
      assert(n == MatchEngine.countMatches(g, Patterns.generateClique(k)), s"k=$k")
      assert(profile.isomorphism == 0)
    }
  }

  test("DFS pattern matching equals the engine on p1/p4/p5") {
    for ((name, p) <- EvalPatterns.numbered if p.labels.isEmpty && p.regularVertices.size <= 5) {
      val (n, profile) = DfsEnumerator.countPattern(spark, g, p)
      assert(n == MatchEngine.countMatches(g, p), name)
      assert(profile.isomorphism > 0, name)
    }
  }

  test("DFS pattern matching equals the engine on labeled p2") {
    val labels6 = TestGraphs.labels(30, 6, seed = 94)
    val g6 = TestGraphs.dataGraph(spark, labEdges, labels6)
    val (n, _) = DfsEnumerator.countPattern(spark, g6, EvalPatterns.p2)
    assert(n == MatchEngine.countMatches(g6, EvalPatterns.p2))
  }

  test("BFS FSM supports equal the engine's label-discovery supports (1 and 2 edges)") {
    for (k <- 1 to 2) {
      val shape = Patterns.generateChain(k + 1)
      val m = MatchEngine.matches(lg, shape, discoverLabels = true)
      val expected = MniSupport.labeledSupports(spark, shape, m)
        .map { case (p, s) => (Check.key(p), s) }.toMap
      val (got, profile) = BfsEnumerator.fsmSupports(spark, lg, k)
      assert(got.map { case (p, s) => (Check.key(p), s) }.toMap == expected, s"k=$k")
      if (k > 1) assert(profile.explored > 0)
      assert(profile.isomorphism > 0)
    }
  }

  test("DFS FSM supports equal BFS FSM supports (3 edges)") {
    val (bfs, _) = BfsEnumerator.fsmSupports(spark, lg, 3)
    val (dfs, profile) = DfsEnumerator.fsmSupports(spark, lg, 3)
    assert(
      dfs.map { case (p, s) => (Check.key(p), s) }.toMap ==
      bfs.map { case (p, s) => (Check.key(p), s) }.toMap
    )
    assert(profile.isomorphism > 0)
  }

  test("G-Miner triangle count equals the engine's") {
    assert(GMinerStyle.triangleCount(spark, g) == MatchEngine.countMatches(g, Patterns.generateClique(3)))
    val sk = TestGraphs.dataGraph(spark, TestGraphs.skewed(50, 160, seed = 95))
    assert(GMinerStyle.triangleCount(spark, sk) == MatchEngine.countMatches(sk, Patterns.generateClique(3)))
  }

  test("G-Miner p2 count equals the engine's") {
    val labels6 = TestGraphs.labels(30, 6, seed = 94)
    val g6 = TestGraphs.dataGraph(spark, labEdges, labels6)
    val got = GMinerStyle.countP2(spark, g6, 0, 1, 2, 3)
    assert(got == MatchEngine.countMatches(g6, EvalPatterns.p2))
  }

  test("Fig 1 shape: baselines explore far more than the result size") {
    val triangles = MatchEngine.countMatches(g, Patterns.generateClique(3))
    val (_, abq) = BfsEnumerator.cliqueCount(spark, g, 3, rstream = false)
    val (_, rs) = BfsEnumerator.cliqueCount(spark, g, 3, rstream = true)
    val (_, fcl) = DfsEnumerator.cliqueCount(spark, g, 3)
    assert(abq.explored > triangles)
    assert(rs.explored > triangles)
    assert(fcl.explored > triangles)
  }

  test("IsoCheck canonical sequence is the greedy order") {
    val lgv = LocalGraph.fromDataGraph(g)
    val some = g.adj.limit(1).collect().head
    val (a, b) = (some.getLong(0), some.getLong(1))
    assert(IsoCheck.isCanonicalSeq(Seq(math.min(a, b), math.max(a, b)), lgv))
    assert(!IsoCheck.isCanonicalSeq(Seq(math.max(a, b), math.min(a, b)), lgv))
  }

  test("IsoCheck spanning embeddings of a triangle in a triangle = 6") {
    val triEdges = Seq((0L, 1L), (1L, 2L), (0L, 2L))
    val lgv = LocalGraph(
      Map(0L -> Array(1L, 2L), 1L -> Array(0L, 2L), 2L -> Array(0L, 1L)),
      Map.empty
    )
    assert(IsoCheck.countSpanningEmbeddings(Patterns.generateClique(3), Seq(0L, 1L, 2L), lgv) == 6)
    assert(IsoCheck.countSpanningEmbeddings(Patterns.generateChain(3), Seq(0L, 1L, 2L), lgv) == 6)
    val _ = triEdges
  }
}
