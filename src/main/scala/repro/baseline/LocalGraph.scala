package repro.baseline

import java.util.Arrays
import repro.graph.DataGraph

/** Driver-collected adjacency view of a (lite-scale) data graph, broadcast
  * to tasks by the pattern-UNaware baselines. The real Arabesque / Fractal /
  * G-Miner keep the graph (or partition) resident per worker the same way;
  * Peregrine's engine deliberately never needs this — it works purely on
  * the distributed edge relation.
  */
final case class LocalGraph(
    adj: Map[Long, Array[Long]], // sorted neighbor arrays
    labels: Map[Long, Int]
) extends Serializable {

  def neighbors(v: Long): Array[Long] = adj.getOrElse(v, LocalGraph.empty)

  def connected(u: Long, v: Long): Boolean =
    Arrays.binarySearch(neighbors(u), v) >= 0

  def degree(v: Long): Int = neighbors(v).length

  def vertexIds: Iterable[Long] = adj.keys
}

object LocalGraph {
  private val empty = Array.empty[Long]

  def fromDataGraph(g: DataGraph): LocalGraph = {
    val adj = g.adj
      .collect()
      .map(r => (r.getLong(0), r.getLong(1)))
      .groupBy(_._1)
      .map { case (v, arr) => v -> arr.map(_._2).sorted }
    val labels = g.labels
      .map(_.collect().map(r => r.getLong(0) -> r.getInt(1)).toMap)
      .getOrElse(Map.empty)
    LocalGraph(adj, labels)
  }

  /** Indexed undirected edge list + incidence, for edge-growth (FSM) baselines. */
  final case class EdgeIndex(
      edges: Array[(Long, Long)],          // sorted canonical (src < dst)
      incident: Map[Long, Array[Int]]      // vertex → sorted edge ids
  ) extends Serializable {
    def incidentEdges(v: Long): Array[Int] = incident.getOrElse(v, Array.empty[Int])
  }

  def edgeIndex(lg: LocalGraph): EdgeIndex = {
    val edges = lg.adj.toSeq
      .flatMap { case (u, ns) => ns.filter(_ > u).map(v => (u, v)) }
      .sorted
      .toArray
    val incident = edges.zipWithIndex
      .flatMap { case ((u, v), i) => Seq(u -> i, v -> i) }
      .groupBy(_._1)
      .map { case (v, arr) => v -> arr.map(_._2).sorted }
    EdgeIndex(edges, incident)
  }
}
