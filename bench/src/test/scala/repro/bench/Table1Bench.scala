package repro.bench

import repro.SparkSpec

/** Table 1 bench: prints the paper-vs-ours bound table and asserts the
  * paper's ordering claim empirically at |P| = 256.
  */
class Table1Bench extends SparkSpec {

  test("Table 1: theoretical bounds + empirical ordering at |P|=256") {
    val empirical = Table1.computeEmpirical(spark)
    val out = Table1.render(empirical)
    println(out)
    TextTable.write("table1.txt", out)

    empirical.foreach { e =>
      assert(e.dne < e.random,
        s"alpha=${e.alpha}: D.NE RF ${e.dne} must beat Random ${e.random}")
      assert(e.dne < e.grid,
        s"alpha=${e.alpha}: D.NE RF ${e.dne} must beat Grid ${e.grid}")
      assert(e.dne < e.dbh,
        s"alpha=${e.alpha}: D.NE RF ${e.dne} must beat DBH ${e.dbh}")
      // D.NE's measured RF must respect the paper's own closed-form bound
      assert(e.dne <= repro.theory.Bounds.distributedNE(e.alpha) + 0.05,
        s"alpha=${e.alpha}: D.NE RF ${e.dne} violates the Theorem-1 bound")
      // measured hash RF should track the analytic expectation within the
      // factor the zero-degree-vertex exclusion introduces (sampled graphs
      // drop isolated vertices from V(E), shrinking RF's denominator)
      val expRand = repro.theory.Bounds.random1D(e.alpha, Table1.P, dMax = 200000)
      assert(e.random / expRand > 0.8 && e.random / expRand < 2.2,
        s"alpha=${e.alpha}: measured random RF ${e.random} implausible vs analytic $expRand")
    }
  }
}
