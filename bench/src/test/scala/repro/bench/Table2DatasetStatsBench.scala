package repro.bench

import repro.SparkSpec
import repro.harness.Table2Stats

/** Reproduces Table 2 (statistics of data sets) at reproduction scale.
  * Paper's values for reference (recorded in EXPERIMENTS.md):
  * AIDS 1896/100/95/103/2.1/Yes, Finger 2159/114/26/26/1.7/Yes,
  * GREC 1045/55/24/29/2.1/Yes, Syn-1 3430/70/100K/1M/9.6/Yes,
  * Syn-2 3430/70/100K/1M/9.4/No.
  */
class Table2DatasetStatsBench extends SparkSpec {

  test("Table 2: dataset statistics") {
    val rows = Table2Stats.rows()
    println(Table2Stats.render(rows))

    assert(rows.size == 5)
    val byName = rows.map(r => r.name -> r).toMap
    // database/query sizes follow the configured protocol (~5% queries)
    assert(byName("AIDS-lite").nD == 285 && byName("AIDS-lite").nQ == 15)
    assert(byName("Finger-lite").nD == 250)
    assert(byName("GREC-lite").nD == 200)
    // Finger is the sparsest set, as in the paper (d = 1.7 vs 2.1)
    assert(byName("Finger-lite").avgDeg < byName("AIDS-lite").avgDeg)
    // the synthetic sets share |D| and size ladder; Syn-1 is the scale-free one
    assert(byName("Syn-1-lite").nD == byName("Syn-2-lite").nD)
    assert(byName("Syn-1-lite").vMax == 2000 && byName("Syn-1-lite").eMax > 2000)
    rows.foreach(r => assert(r.avgDeg > 0 && r.vMax >= r.avgDeg))
  }
}
