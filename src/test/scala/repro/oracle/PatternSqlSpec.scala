package repro.oracle

import repro.{Check, LocalRef, SparkSpec, TestGraphs}
import repro.pattern.{Pattern, Patterns}

/** The oracle SQL compiler itself, validated against the local brute-force
  * reference (so the engine tests rest on two independent checkers).
  */
class PatternSqlSpec extends SparkSpec {

  private lazy val edges = TestGraphs.er(30, 80, seed = 81)
  private lazy val labels = TestGraphs.labels(30, 3, seed = 82)
  private lazy val g = TestGraphs.dataGraph(spark, edges, labels)
  private lazy val ref = LocalRef.graph(edges, labels)

  private def check(p: Pattern): Unit =
    Check.valueVsOracle(spark, LocalRef.canonicalCount(p, ref), PatternSql.countSql(p), g)

  test("plain patterns") {
    check(Patterns.generateClique(3))
    check(Patterns.generateClique(4))
    check(Patterns.generateChain(3))
    check(Patterns.generateChain(4))
    check(Patterns.generateStar(3))
  }

  test("cyclic patterns with non-tree edges") {
    check(Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 1)))
    check(Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 1), (2, 4)))
  }

  test("anti-edge patterns") {
    check(Patterns.generateChain(3).addAntiEdge(1, 3))
    check(Pattern.fromEdges((1, 2), (2, 3), (3, 4), (4, 1), (1, 3)).addAntiEdge(2, 4))
  }

  test("anti-vertex patterns") {
    check(Patterns.generateClique(3).addAntiEdge(1, 4).addAntiEdge(2, 4).addAntiEdge(3, 4))
    check(Patterns.generateChain(2).addAntiEdge(1, 3).addAntiEdge(2, 3))
    check(Patterns.generateChain(3).addAntiEdge(2, 4))
  }

  test("labeled patterns") {
    check(Patterns.generateChain(2).addLabel(1, 0).addLabel(2, 1))
    check(Patterns.generateClique(3).addLabel(1, 0).addLabel(2, 1).addLabel(3, 2))
    check(Patterns.generateChain(3).addLabel(2, 0))
  }

  test("single-vertex and single-edge patterns") {
    check(Pattern.singleton())
    check(Patterns.generateChain(2))
  }

  test("countSql divides by the regular multiplicity") {
    val sql = PatternSql.countSql(Patterns.generateClique(3))
    assert(sql.contains("/ 6"))
    val sqlPath = PatternSql.countSql(Patterns.generateChain(3))
    assert(sqlPath.contains("/ 2"))
  }

  test("fromWhere rejects disconnected regular parts") {
    val disconnected = Pattern(Vector(1, 2, 3, 4), Set((1, 2), (3, 4)), Set.empty, Map.empty)
    assertThrows[IllegalArgumentException](PatternSql.fromWhere(disconnected))
  }
}
