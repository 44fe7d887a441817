package repro.baseline

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.util.LongAccumulator
import repro.graph.DataGraph
import repro.pattern.{Automorphism, Pattern}

/** Depth-first, pattern-UNaware exploration — the Fractal [12] model of
  * §6.3. Each data vertex is a task; tasks enumerate ALL connected (induced)
  * subgraphs reachable from their start vertex via ESU-style recursive
  * extension, keeping no intermediate state materialized (the DFS memory
  * advantage the paper credits Fractal with). Because the exploration is
  * not guided by the pattern, each complete subgraph still pays an
  * isomorphism computation to decide whether / how it matches — the cost
  * Peregrine's plan-guided engine avoids.
  */
object DfsEnumerator {

  final case class Profile(explored: Long, canonicality: Long, isomorphism: Long)

  final case class Accs(
      explored: LongAccumulator,
      canonicality: LongAccumulator,
      isomorphism: LongAccumulator
  ) {
    def toProfile: Profile = Profile(explored.value, canonicality.value, isomorphism.value)
  }

  private def newAccs(spark: SparkSession): Accs =
    Accs(
      spark.sparkContext.longAccumulator("dfs.explored"),
      spark.sparkContext.longAccumulator("dfs.canonicality"),
      spark.sparkContext.longAccumulator("dfs.isomorphism")
    )

  /** ESU enumeration of every connected induced `k`-vertex subgraph, one
    * row per set (column `vs`, the root-first generation order). With
    * `cliquesOnly`, extension is restricted to common neighbors — Fractal's
    * native clique support (isomorphism count 0 in Fig 1b).
    */
  private def esuFrom(
      root: Long,
      lg: LocalGraph,
      k: Int,
      cliquesOnly: Boolean,
      accs: Accs
  ): Seq[Seq[Long]] = {
    val out = collection.mutable.ArrayBuffer.empty[Seq[Long]]
    var explored = 0L
    var checks = 0L

    def nExcl(w: Long, sub: Seq[Long], subNbr: Set[Long]): Seq[Long] =
      lg.neighbors(w).toSeq.filter { u =>
        checks += 1
        u > root && !sub.contains(u) && !subNbr(u)
      }

    def extend(sub: List[Long], ext: List[Long], subNbr: Set[Long]): Unit = {
      explored += 1
      if (sub.size == k) { out += sub.reverse; return }
      var rest = ext
      while (rest.nonEmpty) {
        val w = rest.head
        rest = rest.tail
        if (!cliquesOnly || sub.forall(u => { checks += 1; lg.connected(u, w) })) {
          val fresh = nExcl(w, sub, subNbr)
          extend(w :: sub, rest ++ fresh, subNbr ++ lg.neighbors(w))
        }
      }
    }

    val initExt = lg.neighbors(root).toSeq.filter { u => checks += 1; u > root }
    extend(List(root), initExt.toList, lg.neighbors(root).toSet + root)
    accs.explored.add(explored)
    accs.canonicality.add(checks)
    out.toSeq
  }

  def inducedSets(
      spark: SparkSession,
      g: DataGraph,
      k: Int,
      cliquesOnly: Boolean = false
  ): (DataFrame, Accs) = {
    import spark.implicits._
    val accs = newAccs(spark)
    val lgB = spark.sparkContext.broadcast(LocalGraph.fromDataGraph(g))
    val sets = g.vertices
      .select(col("v"))
      .as[Long]
      .flatMap(root => esuFrom(root, lgB.value, k, cliquesOnly, accs))
      .toDF("vs")
    (sets, accs)
  }

  /** Motif counting (vertex-induced): isomorphism computation per set. */
  def motifCounts(spark: SparkSession, g: DataGraph, size: Int): (Map[String, Long], Profile) = {
    val (sets, accs) = inducedSets(spark, g, size)
    val lgB = spark.sparkContext.broadcast(LocalGraph.fromDataGraph(g))
    val keyUdf = udf { (vs: Seq[Long]) =>
      accs.isomorphism.add(1)
      IsoCheck.patternKeyAndAssignment(IsoCheck.inducedPattern(vs, lgB.value, withLabels = false), vs)._1
    }
    val grouped = sets.select(keyUdf(col("vs")) as "key").groupBy("key").count().collect()
    (grouped.map(r => r.getString(0) -> r.getLong(1)).toMap, accs.toProfile)
  }

  /** Native clique counting (no isomorphism checks, as in Fig 1b). */
  def cliqueCount(spark: SparkSession, g: DataGraph, k: Int): (Long, Profile) = {
    val (sets, accs) = inducedSets(spark, g, k, cliquesOnly = true)
    val n = sets.count()
    (n, accs.toProfile)
  }

  /** Pattern matching: enumerate all k-vertex induced subgraphs, then count
    * the target's spanning embeddings in each by brute force — the
    * per-subgraph isomorphism computation of a pattern-unaware system —
    * and divide by the automorphism multiplicity.
    */
  def countPattern(spark: SparkSession, g: DataGraph, p: Pattern): (Long, Profile) = {
    import spark.implicits._
    val k = p.regularVertices.size
    require(p.antiEdges.isEmpty, "baseline pattern matching handles plain patterns only")
    val (sets, accs) = inducedSets(spark, g, k)
    val lgB = spark.sparkContext.broadcast(LocalGraph.fromDataGraph(g))
    val total = sets
      .select(col("vs"))
      .as[Seq[Long]]
      .map { vs =>
        accs.isomorphism.add(1)
        IsoCheck.countSpanningEmbeddings(p, vs, lgB.value)
      }
      .agg(sum("value"))
      .head() match {
      case r if r.isNullAt(0) => 0L
      case r                  => r.getLong(0)
    }
    val mult = Automorphism.regularMultiplicity(p)
    require(total % mult == 0, s"embedding total $total not divisible by $mult")
    (total / mult, accs.toProfile)
  }

  /** FSM: ESU over the line graph (edge-growth DFS), one isomorphism
    * computation per complete k-edge subgraph, then MNI aggregation.
    */
  def fsmSupports(
      spark: SparkSession,
      g: DataGraph,
      kEdges: Int
  ): (Seq[(Pattern, Long)], Profile) = {
    import spark.implicits._
    val accs = newAccs(spark)
    val lg = LocalGraph.fromDataGraph(g)
    val lgB = spark.sparkContext.broadcast(lg)
    val idxB = spark.sparkContext.broadcast(LocalGraph.edgeIndex(lg))

    val keyed = spark
      .range(idxB.value.edges.length)
      .as[Long]
      .flatMap { rootId =>
        val idx = idxB.value
        def nbrs(eid: Int): Seq[Int] = {
          val (u, v) = idx.edges(eid)
          (idx.incidentEdges(u) ++ idx.incidentEdges(v)).toSeq.filter(_ != eid)
        }
        val out = collection.mutable.ArrayBuffer.empty[Seq[Int]]
        var explored = 0L; var checks = 0L
        def extend(sub: List[Int], ext: List[Int], subNbr: Set[Int]): Unit = {
          explored += 1
          if (sub.size == kEdges) { out += sub.reverse; return }
          var rest = ext
          while (rest.nonEmpty) {
            val w = rest.head
            rest = rest.tail
            val fresh = nbrs(w).filter { u => checks += 1; u > rootId && !sub.contains(u) && !subNbr(u) }
            extend(w :: sub, rest ++ fresh, subNbr ++ nbrs(w))
          }
        }
        val root = rootId.toInt
        val initExt = nbrs(root).filter { u => checks += 1; u > rootId }
        extend(List(root), initExt.toList, nbrs(root).toSet + root)
        accs.explored.add(explored); accs.canonicality.add(checks)
        out.toSeq.map { eids =>
          accs.isomorphism.add(1)
          val es = eids.map(idx.edges)
          val (pat, vs) = IsoCheck.edgePattern(es, lgB.value, withLabels = true)
          IsoCheck.patternKeyAndAssignment(pat, vs)
        }
      }
      .toDF("key", "vs")

    val supports = BaselineSupport.supports(spark, keyed)
    (supports, accs.toProfile)
  }
}
