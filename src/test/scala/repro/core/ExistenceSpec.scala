package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.apps.ClusteringCoeff
import repro.pattern.Patterns

/** Existence queries and early termination (§5.3, Fig 4b/4f). */
class ExistenceSpec extends SparkSpec {

  private lazy val k4p = TestGraphs.dataGraph(spark, TestGraphs.k4Pendant)
  private lazy val er = TestGraphs.dataGraph(spark, TestGraphs.er(40, 100, seed = 51))

  test("existsClique finds the planted 4-clique") {
    assert(Existence.existsClique(k4p, 3))
    assert(Existence.existsClique(k4p, 4))
    assert(!Existence.existsClique(k4p, 5))
  }

  test("exists on arbitrary patterns") {
    assert(Existence.exists(k4p, Patterns.generateChain(3)))
    assert(Existence.exists(k4p, Patterns.generateStar(4))) // vertex 4 has degree 4
    assert(!Existence.exists(k4p, Patterns.generateStar(5))) // max degree is 4
  }

  test("existsEarlyStop agrees with exists") {
    for (k <- 3 to 5) {
      assert(Existence.existsEarlyStop(k4p, Patterns.generateClique(k)) ==
             Existence.existsClique(k4p, k), s"k=$k")
    }
    assert(Existence.existsEarlyStop(er, Patterns.generateClique(3)) ==
           Existence.existsClique(er, 3))
  }

  test("large clique existence terminates fast on graphs without one") {
    // The join pipeline empties early — this must complete quickly.
    assert(!Existence.existsClique(er, 14))
  }

  test("countAtLeast thresholds") {
    val triangles = MatchEngine.countMatches(er, Patterns.generateClique(3))
    assert(triangles > 1)
    val m = MatchEngine.matches(er, Patterns.generateClique(3))
    assert(Existence.countAtLeast(m, 1))
    assert(Existence.countAtLeast(m, triangles))
    assert(!Existence.countAtLeast(m, triangles + 1))
  }

  test("clustering coefficient of fig6 (2 triangles, 14 wedges)") {
    val fig6 = TestGraphs.dataGraph(spark, TestGraphs.fig6)
    assert(ClusteringCoeff.triangles(fig6) == 2)
    assert(ClusteringCoeff.wedges(fig6) == 14)
    assert(math.abs(ClusteringCoeff.coefficient(fig6) - 6.0 / 28.0) < 1e-12)
  }

  test("exceedsBound agrees with the exact coefficient") {
    val cc = ClusteringCoeff.coefficient(er)
    assert(cc > 0)
    assert(ClusteringCoeff.exceedsBound(er, cc * 0.5))
    assert(!ClusteringCoeff.exceedsBound(er, cc * 1.5))
  }

  test("exceedsBound on a triangle-free-ish bound edge cases") {
    val star = TestGraphs.dataGraph(spark, Seq((1L, 2L), (1L, 3L), (1L, 4L)))
    assert(ClusteringCoeff.triangles(star) == 0)
    assert(!ClusteringCoeff.exceedsBound(star, 0.01))
  }
}
