package repro.bench

/** Table 6: anti-vertex p7, anti-edge p8, clique existence queries. */
class Table6ConstraintsBench extends BenchBase {
  test("Table 6: constraint mining and existence queries") {
    val (rendered, rows) = Tables.table6(spark, data)
    println(rendered)
    // The planted 6-clique must be found; 14-cliques must not exist in the
    // sparse lite graphs.
    val byApp = rows.groupBy(_._1)
    assert(byApp("Exist 6-Clique").head._3.head._2.value == "true")
    for ((_, g, cells) <- byApp("Exist 14-Clique") if g == "PA")
      assert(cells.head._2.value == "false")
  }
}
