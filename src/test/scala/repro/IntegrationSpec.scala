package repro

import repro.apps.GasEngine
import repro.bench.{Datasets, Runners, TextTable}
import repro.core.CellPartitioner
import repro.graph.{GraphGen, LocalMetrics}

/** End-to-end pipeline tests: generate → partition (every method in the
  * paper's tables) → measure → run applications, on a small RMAT graph.
  * This is the same path the table benches take, at unit-test scale.
  */
class IntegrationSpec extends SparkSpec {

  private lazy val edges: Array[(Long, Long)] =
    GraphGen.rmat(spark, scale = 10, edgeFactor = 8, seed = 77).collect().sorted
  private lazy val rdd = spark.sparkContext.parallelize(edges.toSeq, 8).cache()

  private val allMethods =
    Seq("Rand.", "2D-R.", "DBH", "Obli.", "H.G.", "HDRF", "NE", "SNE",
        "Sheep", "P.M.", "X.P.", "Spinner", "D.NE")

  for (method <- allMethods) {
    test(s"pipeline[$method]: total, in-range, measurable assignment") {
      val r = Runners.run(method, spark, rdd, edges, p = 8)
      assert(r.assign.length == edges.length, s"$method dropped edges")
      r.assign.foreach(x => assert(x >= 0 && x < 8))
      assert(r.rf >= 1.0 && r.rf <= 8.0)
      assert(r.eb >= 1.0 && r.vb >= 1.0)
      assert(r.seconds >= 0.0)
    }
  }

  test("quality ordering across the board: D.NE beats every hash/stream method") {
    val dne = Runners.run("D.NE", spark, rdd, edges, 8).rf
    for (m <- Seq("Rand.", "2D-R.", "DBH", "Obli.", "HDRF")) {
      val rf = Runners.run(m, spark, rdd, edges, 8).rf
      assert(dne < rf, s"D.NE RF $dne should beat $m RF $rf on a skewed graph")
    }
  }

  test("offline NE is the quality ceiling among our greedy family") {
    val ne = Runners.run("NE", spark, rdd, edges, 8).rf
    val dne = Runners.run("D.NE", spark, rdd, edges, 8).rf
    val sne = Runners.run("SNE", spark, rdd, edges, 8).rf
    assert(ne <= dne + 0.2, s"NE ($ne) should be at least about as good as D.NE ($dne)")
    assert(ne <= sne + 0.2, s"NE ($ne) should be at least about as good as SNE ($sne)")
  }

  test("applications give identical results on every partitioning") {
    val src = edges.flatMap(e => Seq(e._1, e._2)).min
    val reference = TestGraphs.bfsDistances(edges, src)
    for (m <- Seq("Rand.", "D.NE", "NE")) {
      val r = Runners.run(m, spark, rdd, edges, 8)
      val engine = new GasEngine(r.edges, r.assign, 8)
      val (dist, _) = engine.sssp(src)
      (0 until engine.st.numLocalVertices).foreach { lv =>
        val v = engine.st.vertexIds(lv)
        assert(dist(lv) == reference.getOrElse(v, Long.MaxValue),
          s"$m changed SSSP result at vertex $v")
      }
    }
  }

  test("lower RF implies lower PageRank communication (the paper's causal chain)") {
    val byRf = Seq("Rand.", "2D-R.", "D.NE").map { m =>
      val r = Runners.run(m, spark, rdd, edges, 8)
      val com = new GasEngine(r.edges, r.assign, 8).pageRank(3)._2.comBytes
      (r.rf, com)
    }.sortBy(_._1)
    byRf.sliding(2).foreach {
      case Seq((rf1, com1), (rf2, com2)) =>
        assert(com1 <= com2, s"RF $rf1 → COM $com1 but RF $rf2 → COM $com2")
      case _ =>
    }
  }

  test("dataset catalogue generates all advertised graphs deterministically") {
    for (spec <- Datasets.roads) {
      val a = spec.edges(spark).count()
      val b = spec.edges(spark).count()
      assert(a == b && a > 0, s"${spec.name} not deterministic or empty")
    }
  }

  test("catalogue names are unique and resolvable") {
    val names = (Datasets.skewed ++ Datasets.roads).map(_.name)
    assert(names.distinct.length == names.length)
    assert(Datasets.table4.map(_.name).forall(names.contains))
  }

  test("Runners rejects unknown methods") {
    intercept[IllegalArgumentException](
      Runners.run("nope", spark, rdd, edges, 4))
  }

  test("CellPartitioner routes keys identically to their cell id") {
    val cp = new CellPartitioner(16)
    assert(cp.numPartitions == 16)
    (0 until 16).foreach(i => assert(cp.getPartition(i) == i))
    assert(cp == new CellPartitioner(16))
    assert(cp != new CellPartitioner(8))
  }

  test("TextTable renders aligned rows and formats doubles") {
    val out = TextTable.render("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    assert(out.contains("== T =="))
    assert(out.linesIterator.size == 5)
    assert(TextTable.f(1.23456) == "1.23")
    assert(TextTable.f(1.23456, 3) == "1.235")
  }
}
