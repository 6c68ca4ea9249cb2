package repro.bench

import repro.{Oracle, SparkSpec}
import repro.expts.{Experiments, Report}
import repro.spark.SparkGraph

/** T1 / Fig. 12 — dataset statistics of the synthetic stand-ins. */
class DatasetStatsBench extends SparkSpec {

  private val names = Seq("ppi", "author", "german", "wiki", "english", "stack")

  test("T1: dataset statistics table") {
    println(Report.datasetStats(names))
    val (_, rows) = Experiments.datasetStats(names)
    // layer counts must match the paper's datasets exactly
    assert(rows.map(r => (r.head, r(4).toInt)).toMap ==
      Map("ppi" -> 8, "author" -> 10, "german" -> 14, "wiki" -> 24,
          "english" -> 15, "stack" -> 24))
    // |union E_i| <= sum |E_i|
    rows.foreach(r => assert(r(3).toLong <= r(2).toLong))
  }

  test("T1: per-layer stats of ppi validated by DuckDB via Spark SQL") {
    val gen = Experiments.dataset("ppi")
    val edges = SparkGraph.toDF(spark, gen.graph)
    Oracle.assertEquivalent(
      SparkGraph.layerStats(edges),
      "SELECT layer, COUNT(*) AS edges FROM edges GROUP BY layer",
      "edges" -> edges)
    assert(edges.count() == gen.graph.totalEdgeCount)
  }
}
