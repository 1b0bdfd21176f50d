package repro.bench

import repro.SparkSpec

/** Tables V & VI — the Watts–Strogatz density sweep (one shared run). */
class TableVBench extends SparkSpec {

  private lazy val rows = Tables.wsSweep(spark)

  test("Table V: running time on synthetic datasets") {
    BenchOut.save("tableV", Tables.renderTableV(rows))
    // paper: HG's runtime is flat in k and smallest overall
    val hgT = rows.map(_.hg.millis).sum
    val lpT = rows.map(_.lp.millis).sum
    assert(hgT <= lpT, s"HG=$hgT ms vs LP=$lpT ms")
    // runtime grows with density for LP (deg 8 vs deg 64 at k=3)
    val lp8 = rows.find(r => r.dataset == "deg=8" && r.k == 3).get.lp.millis
    val lp64 = rows.find(r => r.dataset == "deg=64" && r.k == 3).get.lp.millis
    assert(lp64 >= lp8, s"LP deg=64 ($lp64 ms) should cost >= deg=8 ($lp8 ms)")
  }

  test("Table VI: size of S on synthetic datasets") {
    BenchOut.save("tableVI", Tables.renderTableVI(rows))
    // paper: sparse WS has no 6-cliques at deg 8 (d/2 < k-1)
    val deg8k6 = rows.find(r => r.dataset == "deg=8" && r.k == 6).get
    assert(deg8k6.hg.size == 0 && deg8k6.lp.size == 0)
    // size of S grows with density at fixed k
    for (k <- BenchConfig.ks) {
      val s8 = rows.find(r => r.dataset == "deg=8" && r.k == k).get.lp.size
      val s64 = rows.find(r => r.dataset == "deg=64" && r.k == k).get.lp.size
      assert(s64 >= s8, s"k=$k: |S| should grow with density")
    }
    // aggregate: LP at least matches HG
    val ok = rows.filter(r => r.lp.status == "ok" && r.hg.status == "ok")
    assert(ok.map(_.lp.size.toLong).sum >= ok.map(_.hg.size.toLong).sum)
  }
}
