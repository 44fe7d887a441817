package repro.bench

import repro.SparkSpec

/** Base for table benches: shared SparkSession + shared lite datasets.
  * Each suite prints its paper-style table to stdout (captured in
  * bench_output.txt) and asserts cross-system agreement on cells that
  * completed.
  */
trait BenchBase extends SparkSpec {
  lazy val data: LiteData = LiteData.forSpark(spark)

  /** Assert that all completed numeric cells of each row agree. */
  def assertAgreement(rows: Seq[Tables.Row]): Unit =
    for ((app, g, cells) <- rows) {
      val numeric = cells.flatMap { case (_, c) => c.seconds.map(_ => c.value) }
        .filter(_.forall(ch => ch.isDigit))
      assert(numeric.distinct.size <= 1, s"systems disagree on $app/$g: $cells")
    }
}
