package repro.bench

import repro.SparkSpec

/** Table 6 bench: road networks. Asserts the paper's claim that the direct
  * and indirect optimizers (ParMETIS-like, Sheep, XtraPuLP-like, D.NE) all
  * reach RF ≈ 1 while the hash family stays far above.
  */
class Table6Bench extends SparkSpec {

  test("Table 6: road networks, |P|=64") {
    val measured = Table6.compute(spark)
    val out = Table6.render(measured)
    println(out)
    TextTable.write("table6.txt", out)

    val highQuality = Seq("P.M.", "Sheep", "X.P.", "D.NE")
    val hashFamily = Seq("Rand.", "2D-R.")
    measured.zip(Datasets.roads).foreach { case (rf, spec) =>
      highQuality.foreach { m =>
        assert(rf(m) < 1.8, s"${spec.name}: $m RF ${rf(m)} should be near 1 on a road network")
      }
      hashFamily.foreach { h =>
        highQuality.foreach { m =>
          assert(rf(m) < rf(h),
            s"${spec.name}: $m (${rf(m)}) must beat $h (${rf(h)})")
        }
      }
      // the refining greedy family sits in between, as in the paper
      assert(rf("Obli.") < rf("Rand."), s"${spec.name}: Oblivious must improve on Random")
      assert(rf("D.NE") < rf("Obli."), s"${spec.name}: D.NE must beat Oblivious")
    }
  }
}
