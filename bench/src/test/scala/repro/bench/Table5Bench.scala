package repro.bench

import repro.SparkSpec

/** Table 5 bench: the 7 skewed graphs × 5 partitioners × 3 applications.
  * Asserts the paper's headline claims: D.NE has the best RF everywhere,
  * near-α edge balance, and the least communication (hence lowest modeled
  * elapsed time) for the communication-heavy PageRank.
  */
class Table5Bench extends SparkSpec {

  test("Table 5: graph applications on |P|=64") {
    val data = Table5.compute(spark)
    val out = Table5.render(data)
    println(out)
    TextTable.write("table5.txt", out)

    data.foreach { case (graph, cells) =>
      val byM = cells.toMap
      val dne = byM("D.NE")
      // quality claims
      cells.foreach { case (m, c) =>
        if (m != "D.NE")
          assert(dne.rf < c.rf, s"$graph: D.NE RF ${dne.rf} must beat $m RF ${c.rf}")
      }
      assert(dne.eb < 1.35, s"$graph: D.NE edge balance ${dne.eb} should stay near alpha")
      // communication claims (PR is the heavy one, as in the paper)
      assert(dne.pr.comMB < byM("Rand.").pr.comMB,
        s"$graph: D.NE PR COM ${dne.pr.comMB} vs Random ${byM("Rand.").pr.comMB}")
      assert(dne.pr.comMB < byM("2D-R.").pr.comMB)
      assert(dne.pr.et < byM("Rand.").pr.et,
        s"$graph: D.NE PR ET ${dne.pr.et} vs Random ${byM("Rand.").pr.et}")
      // WCC communication also drops with RF
      assert(dne.wcc.comMB < byM("Rand.").wcc.comMB)
    }
  }
}
