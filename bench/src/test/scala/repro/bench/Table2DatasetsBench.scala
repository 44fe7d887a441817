package repro.bench

/** Table 2: dataset statistics of the lite substitutions. */
class Table2DatasetsBench extends BenchBase {
  test("Table 2: dataset statistics") {
    val (rendered, rows) = Tables.table2(spark, data)
    println(rendered)
    assert(rows.size == 5)
    assert(rows.forall(_._3.head._2.value.contains("|V|=")))
  }
}
