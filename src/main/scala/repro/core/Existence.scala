package repro.core

import java.util.concurrent.ConcurrentHashMap
import java.util.concurrent.atomic.AtomicLong
import org.apache.spark.sql.DataFrame
import repro.graph.DataGraph
import repro.pattern.{Pattern, Patterns}

/** Early termination for existence queries (§5.3).
  *
  * Peregrine's matching threads periodically observe a stop notification
  * raised by the user function (`stopExploration()`). On the Spark
  * substrate we model this two ways:
  *
  *  - `exists`: a `LIMIT 1` on the match DataFrame — Catalyst's local-limit
  *    stops each partition after its first row, the global limit stops the
  *    job after the first partition delivers;
  *  - `countAtLeast`: a shared stop flag polled by every task between rows,
  *    mirroring the paper's periodic notification check. Because this
  *    reproduction runs `local[*]` (like Peregrine, a single machine), the
  *    tasks share the driver JVM and an AtomicLong is a faithful analogue
  *    of Peregrine's thread-local-then-aggregated counters.
  */
object Existence {

  /** Shared per-query counters (single-machine / local-mode assumption). */
  private val counters = new ConcurrentHashMap[String, AtomicLong]()
  private val queryIds = new AtomicLong(0)

  /** Whether at least one match of `p` exists in `g` (LIMIT-1 pushdown). */
  def exists(g: DataGraph, p: Pattern): Boolean =
    !MatchEngine.matches(g, p).isEmpty

  /** Fig 4f: whether a k-clique exists.
    *
    * Implemented as stepwise growth with an emptiness check after every
    * extension — the dataflow analogue of Peregrine terminating its 14-clique
    * search as soon as the exploration frontier dies (§6.5). A single
    * monolithic k-clique join program would also be correct, but for large k
    * (the paper uses k = 14) its ~k²/2-join Catalyst plan is prohibitively
    * expensive to optimize, so each step is materialized (localCheckpoint)
    * to keep plans small; dying frontiers stop the query immediately.
    */
  def existsClique(g: DataGraph, k: Int): Boolean = {
    require(k >= 1)
    if (k == 1) return g.numVertices > 0
    if (k <= 4) return exists(g, Patterns.generateClique(k))
    import org.apache.spark.sql.functions._
    def c(i: Int) = s"m_$i"
    def edgeRel(s: String, d: String) = g.adj.select(col("src") as s, col("dst") as d)
    var cur = g.edges.select(col("src") as c(1), col("dst") as c(2)).localCheckpoint(true)
    var i = 2
    while (i < k) {
      i += 1
      var next = cur
        .join(edgeRel("_as", "_ad"), col(c(i - 1)) === col("_as"))
        .drop("_as")
        .withColumnRenamed("_ad", c(i))
        .filter(col(c(i)) > col(c(i - 1)))
      for (j <- 1 to i - 2)
        next = next
          .join(edgeRel("_xs", "_xd"), col(c(j)) === col("_xs") && col(c(i)) === col("_xd"))
          .drop("_xs", "_xd")
      cur = next.localCheckpoint(true)
      if (cur.isEmpty) return false
    }
    true
  }

  /** Early-terminating check that `df` yields at least `target` rows: every
    * task increments a shared counter and stops consuming its input as soon
    * as the global count reaches `target`, so upstream (pipelined) work
    * stops too — the dataflow analogue of `stopExploration()`.
    */
  def countAtLeast(df: DataFrame, target: Long): Boolean = {
    require(target >= 1)
    val key = s"existence-${queryIds.incrementAndGet()}"
    val counter = new AtomicLong(0)
    counters.put(key, counter)
    try {
      df.foreachPartition { (rows: Iterator[org.apache.spark.sql.Row]) =>
        val c = counters.get(key)
        // c is null only if this closure ran off-driver (non-local master) —
        // fall back to exhaustive consumption in that case.
        var stop = false
        while (rows.hasNext && !stop) {
          rows.next()
          if (c != null) stop = c.incrementAndGet() >= target
        }
      }
      counter.get() >= target
    } finally counters.remove(key)
  }

  /** Early-terminating existence of `p` in `g` via the stop-flag path. */
  def existsEarlyStop(g: DataGraph, p: Pattern): Boolean =
    countAtLeast(MatchEngine.matches(g, p), 1)
}
