package repro.bench

import repro.SparkSpec

/** Table IV — LP vs the exact solution on the six small graphs. */
class TableIVBench extends SparkSpec {

  test("Table IV: LP vs OPT with error ratio") {
    val rows = Tables.tableIV(spark)
    BenchOut.save("tableIV", Tables.renderTableIV(rows))

    for (r <- rows if r.opt != "OOT" && r.opt != "OOM") {
      val opt = r.opt.toInt
      // LP never exceeds the optimum and is a k-approximation
      assert(r.lp <= opt, s"${r.name} k=${r.k}: LP=${r.lp} > OPT=$opt")
      assert(r.lp * r.k >= opt, s"${r.name} k=${r.k}: approximation bound broken")
      // paper: error ratio at most 8%; allow a slightly wider band on the
      // synthetic stand-ins
      if (opt > 0)
        assert((opt - r.lp).toDouble / opt <= 0.25,
          s"${r.name} k=${r.k}: ER too large (LP=${r.lp}, OPT=$opt)")
    }
    // OPT must complete on at least half the cells (they are tiny)
    assert(rows.count(r => r.opt != "OOT" && r.opt != "OOM") >= rows.size / 2)
  }
}
