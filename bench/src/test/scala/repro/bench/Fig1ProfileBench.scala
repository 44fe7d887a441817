package repro.bench

/** Fig 1b/1c: profiling the pattern-unaware baselines' wasted work. */
class Fig1ProfileBench extends BenchBase {
  test("Fig 1: explored / canonicality / isomorphism profiles") {
    val (rendered, rows) = Tables.fig1(spark, data)
    println(rendered)
    // Baselines must explore (far) more than the result size — the 'x'
    // multipliers in the rendered cells; PRG rows carry zero checks.
    for ((_, _, cells) <- rows; (sys, c) <- cells if sys == "PRG")
      assert(c.value.contains("canon=0 iso=0"))
  }
}
