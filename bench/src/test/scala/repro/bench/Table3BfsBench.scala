package repro.bench

/** Table 3: PRG vs breadth-first enumeration (Arabesque / RStream proxies). */
class Table3BfsBench extends BenchBase {
  test("Table 3: motifs, FSM, cliques vs BFS baselines") {
    val (rendered, rows) = Tables.table3(spark, data)
    println(rendered)
    assertAgreement(rows)
    // PRG must complete every cell it attempts.
    // PRG may hit the harness budget ('x') on the heaviest cells, but a
    // '-' means it errored — that is always a bug.
    for ((app, g, cells) <- rows; (sys, c) <- cells if sys == "PRG")
      assert(c.value != "-", s"PRG errored on $app/$g")
  }
}
