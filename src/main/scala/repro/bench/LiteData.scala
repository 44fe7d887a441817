package repro.bench

import org.apache.spark.sql.SparkSession
import repro.graph.{DataGraph, GraphGen}

/** Lazily-built evaluation datasets shared by the table runners. Each lite
  * graph is built (and cached) on first use; the cache lives for the bench
  * JVM, which runs the table suites sequentially.
  */
final class LiteData(spark: SparkSession, val scale: Double = GraphGen.scaleFromEnv) {
  lazy val mi: DataGraph = GraphGen.miLite(spark, scale).graph
  lazy val pa: DataGraph = GraphGen.paLite(spark, scale).graph
  lazy val paL: DataGraph = GraphGen.paLiteLabeled(spark, scale).graph
  lazy val ok: DataGraph = GraphGen.okLite(spark, scale).graph
  lazy val fr: DataGraph = GraphGen.frLite(spark, scale).graph
  lazy val okL: DataGraph = GraphGen.okLiteLabeled6(spark, scale).graph
  lazy val frL: DataGraph = GraphGen.frLiteLabeled6(spark, scale).graph
  lazy val okClique: DataGraph = GraphGen.okLiteWithClique(spark, 6, scale).graph
}

object LiteData {
  private var shared: LiteData = _

  /** One instance per JVM so consecutive bench suites reuse cached graphs. */
  def forSpark(spark: SparkSession): LiteData = synchronized {
    if (shared == null) shared = new LiteData(spark)
    shared
  }
}
