package repro.bench

import repro.SparkSpec
import repro.graphdata.Datasets

/** Table I — statistics of the dataset stand-ins (n, m, #k-cliques). */
class TableIBench extends SparkSpec {

  test("Table I: dataset statistics") {
    val rows = Tables.tableI(spark)
    BenchOut.save("tableI", Tables.renderTableI(rows))

    // shape assertions mirroring the paper's Table I
    for (r <- rows) {
      assert(r.n > 0 && r.m > 0)
      // community stand-ins must actually contain cliques at every k
      assert(r.counts.head > 0, s"${r.name} has no triangles")
    }
    // the dense stand-ins (FB/FL/OR) dominate clique counts at k=6,
    // mirroring the paper where dense graphs explode with k
    val byName = rows.map(r => r.name -> r).toMap
    assert(byName("FB").counts.last > byName("FTB").counts.last)
    assert(byName("OR").counts.last > byName("SK").counts.last)
  }
}
