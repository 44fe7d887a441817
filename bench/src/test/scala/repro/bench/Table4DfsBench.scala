package repro.bench

/** Table 4: PRG vs depth-first enumeration (Fractal proxy). */
class Table4DfsBench extends BenchBase {
  test("Table 4: motifs, FSM, cliques, pattern matching vs DFS baseline") {
    val (rendered, rows) = Tables.table4(spark, data)
    println(rendered)
    assertAgreement(rows)
    // PRG may hit the harness budget ('x') on the heaviest cells, but a
    // '-' means it errored — that is always a bug.
    for ((app, g, cells) <- rows; (sys, c) <- cells if sys == "PRG")
      assert(c.value != "-", s"PRG errored on $app/$g")
  }
}
