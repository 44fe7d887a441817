package repro.bench

/** Table 5: PRG vs the task-oriented purpose-built baseline (G-Miner proxy). */
class Table5GMinerBench extends BenchBase {
  test("Table 5: 3-cliques and labeled p2 vs G-Miner proxy") {
    val (rendered, rows) = Tables.table5(spark, data)
    println(rendered)
    assertAgreement(rows)
    // PRG may hit the harness budget ('x') on the heaviest cells, but a
    // '-' means it errored — that is always a bug.
    for ((app, g, cells) <- rows; (sys, c) <- cells if sys == "PRG")
      assert(c.value != "-", s"PRG errored on $app/$g")
  }
}
