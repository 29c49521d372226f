package repro.bench

import repro.SparkSpec
import repro.harness.Table4GedPrior

/** Reproduces Table 4 (costs of computing the GED prior distribution).
  * Paper reference (τ̂=10, 12×32-CPU cluster): ΣTᵢ 70.32h/16.91h/15.40h/
  * 6.31h/6.31h, ΣSᵢ 1.5kb/0.4kb/0.4kb/0.1kb/0.1kb, maxTᵢ ≈ 0.3–0.4h,
  * maxSᵢ ≈ 0.01–0.02kb. Shape to reproduce: fully parallel processes, so
  * realized wall time ≈ maxTᵢ ≪ ΣTᵢ; real sets cost more than syn sets
  * because their v-grid is denser (Section 7.2's explanation).
  */
class Table4GedPriorBench extends SparkSpec {

  test("Table 4: GED prior distribution costs (tauHat=10)") {
    val rows = Table4GedPrior.rows(spark, tauHat = 10)
    println(Table4GedPrior.render(rows))

    assert(rows.size == 5)
    rows.foreach { r =>
      assert(r.maxTimeMs <= r.sumTimeMs + 1e-9, r.name)
      assert(r.maxSpaceBytes <= r.sumSpaceBytes, r.name)
      assert(r.maxSpaceBytes == (r.tauHat + 1) * 8L, r.name) // one F(·,v) row per process
      assert(r.nProcesses >= 1, r.name)
    }
    val byName = rows.map(r => r.name -> r).toMap
    // the real sets have denser v-grids than the syn ladder (5 sizes)
    assert(byName("AIDS-lite").nProcesses > byName("Syn-1-lite").nProcesses)
    assert(byName("Syn-1-lite").nProcesses == 5)
  }
}
