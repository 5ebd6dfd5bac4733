package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.graph.Metrics

/** Catalyst/DuckDB cross-checks over a real Distributed NE assignment: the
  * quality metrics the paper reports are plain SQL aggregations, so the
  * oracle validates the whole measurement path, not just "it ran".
  */
class DistributedNEOracleSpec extends SparkSpec {

  private lazy val assignDF = {
    val edges = TestGraphs.skewed(200, 1200, seed = 31)
    val res = DistributedNE.partition(spark,
      spark.sparkContext.parallelize(edges.toSeq, 4), DistributedNE.Config(4))
    val df = Metrics.assignmentDF(spark, res.assignments).cache()
    df.count()
    res.assignments.unpersist(blocking = false)
    df
  }

  test("ORACLE: every input edge appears exactly once in the assignment") {
    val counts = assignDF.groupBy("u", "v").agg(count(lit(1)) as "n")
      .groupBy("n").agg(count(lit(1)) as "edges")
    Oracle.assertEquivalent(counts,
      """SELECT n, COUNT(*) AS edges FROM (
        |  SELECT u, v, COUNT(*) AS n FROM assign GROUP BY u, v
        |) GROUP BY n""".stripMargin,
      "assign" -> assignDF)
    assert(counts.collect().map(r => r.getLong(0)).toSeq == Seq(1L))
  }

  test("ORACLE: per-partition sizes from SQL match DuckDB") {
    val sizes = assignDF.groupBy("part").agg(count(lit(1)) as "edges").orderBy("part")
    Oracle.assertEquivalent(sizes,
      "SELECT part, COUNT(*) AS edges FROM assign GROUP BY part ORDER BY part",
      "assign" -> assignDF)
  }

  test("ORACLE: replication-factor numerator via SQL matches DuckDB") {
    val numerator = Metrics.replicas(assignDF).agg(count(lit(1)) as "replicas")
    Oracle.assertEquivalent(numerator,
      """SELECT COUNT(*) AS replicas FROM (
        |  SELECT DISTINCT part, u AS x FROM assign
        |  UNION
        |  SELECT DISTINCT part, v AS x FROM assign
        |)""".stripMargin,
      "assign" -> assignDF)
  }

  test("DataFrame metrics agree with the paper's definitions on this run") {
    val s = Metrics.summary(assignDF)
    assert(s.numParts <= 4)
    assert(s.replicationFactor >= 1.0 && s.replicationFactor <= 4.0)
    assert(s.edgeBalance >= 1.0 && s.edgeBalance <= 1.25)
  }
}
