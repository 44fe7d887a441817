package repro.bench

/** Fig 10: benefit of symmetry breaking (PRG vs PRG-U), backing Table 1. */
class Fig10SymmetryBench extends BenchBase {
  test("Fig 10: symmetry breaking on/off") {
    val (rendered, rows) = Tables.fig10(spark, data)
    println(rendered)
    assertAgreement(rows) // PRG-U must compute identical results, just slower
    for ((app, g, cells) <- rows) {
      val m = cells.toMap
      for (prg <- m("PRG").seconds; prgu <- m("PRG-U").seconds)
        assert(prgu >= prg * 0.5, s"PRG-U unexpectedly much faster on $app/$g")
    }
  }
}
