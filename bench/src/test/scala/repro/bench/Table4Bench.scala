package repro.bench

import repro.SparkSpec

/** Table 4 bench: HDRF / NE / SNE / Distributed NE on the four mid-scale
  * stand-in graphs. Asserts the paper's quality ordering: offline NE best,
  * D.NE ≈ SNE, HDRF clearly worst.
  */
class Table4Bench extends SparkSpec {

  test("Table 4: sequential comparison, |P|=64") {
    val results = Table4.compute(spark)
    val out = Table4.render(results)
    println(out)
    TextTable.write("table4.txt", out)

    results.foreach { case (graph, r) =>
      val rf = r.view.mapValues(_.rf).toMap
      assert(rf("NE") <= rf("SNE") + 0.05,
        s"$graph: offline NE (${rf("NE")}) should be at least as good as SNE (${rf("SNE")})")
      assert(rf("NE") <= rf("D.NE") + 0.05,
        s"$graph: offline NE (${rf("NE")}) should be at least as good as D.NE (${rf("D.NE")})")
      assert(rf("D.NE") < rf("HDRF"),
        s"$graph: D.NE (${rf("D.NE")}) must beat HDRF (${rf("HDRF")})")
      assert(rf("SNE") < rf("HDRF"),
        s"$graph: SNE (${rf("SNE")}) must beat HDRF (${rf("HDRF")})")
      // completeness of all four assignments
      r.values.foreach(x => assert(x.assign.length == x.edges.length))
    }
  }
}
