package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Dataset statistics for the Table 2 reproduction: |V|, |E|, |L|, max and
  * average degree. Computed from the substrate's canonical edge relation.
  */
object GraphStats {

  final case class Stats(numVertices: Long, numEdges: Long, numLabels: Option[Long], maxDegree: Long, avgDegree: Double)

  def describe(g: DataGraph): Stats = {
    val row = degreeDf(g).agg(max("deg") as "maxd", avg("deg") as "avgd").head()
    val nLabels = g.labels.map(_.select(countDistinct("lab")).head().getLong(0))
    Stats(g.numVertices, g.numEdges, nLabels, row.getLong(0), row.getDouble(1))
  }

  /** Per-vertex degree as a DataFrame (v, deg) — oracle-checkable. */
  def degreeDf(g: DataGraph): DataFrame =
    g.adj.groupBy(col("src") as "v").agg(count(lit(1)) as "deg")
}
