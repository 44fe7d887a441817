package repro.apps

import repro.{Check, LocalRef, SparkSpec, TestGraphs}
import repro.core.{MatchEngine, VertexInduced}
import repro.pattern.{CanonicalForm, Patterns}

/** Motif counting (Fig 4e) and clique counting (Fig 4c). */
class MotifCliqueSpec extends SparkSpec {

  private lazy val erEdges = TestGraphs.er(35, 110, seed = 61)
  private lazy val er = TestGraphs.dataGraph(spark, erEdges)
  private lazy val ref = LocalRef.graph(erEdges)

  test("3-motif counts vs oracle and local reference") {
    val counts = MotifCount.count(er, 3)
    assert(counts.size == 2)
    for ((p, n) <- counts) {
      assert(n == LocalRef.canonicalCount(VertexInduced.toEdgeInduced(p), ref), s"motif $p")
      Check.engineVsOracle(spark, er, VertexInduced.toEdgeInduced(p))
    }
  }

  test("4-motif counts vs local reference") {
    val counts = MotifCount.count(er, 4)
    assert(counts.size == 6)
    for ((p, n) <- counts)
      assert(n == LocalRef.canonicalCount(VertexInduced.toEdgeInduced(p), ref), s"motif $p")
  }

  test("motif totals are consistent across symmetry modes") {
    assert(MotifCount.total(er, 3) == MotifCount.total(er, 3, symmetry = false))
    val withSym = MotifCount.count(er, 4).map { case (p, n) => (CanonicalForm.key(p), n) }.toMap
    val noSym = MotifCount.count(er, 4, symmetry = false).map { case (p, n) => (CanonicalForm.key(p), n) }.toMap
    assert(withSym == noSym)
  }

  test("clique counts vs oracle") {
    for (k <- 3 to 5)
      assert(CliqueCount.count(er, k) == Check.engineVsOracle(spark, er, Patterns.generateClique(k)))
  }

  test("clique counts on the planted-K4 fixture") {
    val g = TestGraphs.dataGraph(spark, TestGraphs.k4Pendant)
    assert(CliqueCount.count(g, 3) == 4)
    assert(CliqueCount.count(g, 4) == 1)
    assert(CliqueCount.count(g, 5) == 0)
  }

  test("clique PRG-U equals PRG") {
    for (k <- 3 to 4)
      assert(CliqueCount.count(er, k, symmetry = false) == CliqueCount.count(er, k))
  }

  test("evaluation patterns p1–p6 count correctly on er") {
    val labels = TestGraphs.labels(35, 6, seed = 62)
    val lg = TestGraphs.dataGraph(spark, erEdges, labels)
    val lref = LocalRef.graph(erEdges, labels)
    for ((name, p) <- EvalPatterns.numbered) {
      val g = if (p.labels.nonEmpty) lg else er
      val r = if (p.labels.nonEmpty) lref else ref
      assert(MatchEngine.countMatches(g, p) == LocalRef.canonicalCount(p, r), name)
    }
  }
}
