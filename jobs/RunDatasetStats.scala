package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.expts.Report
import repro.spark.SparkGraph

/** T1 / Fig. 12 — dataset statistics, with per-layer edge counts computed
  * by Spark SQL over the edges DataFrame of each preset.
  *
  * spark-submit --class repro.jobs.RunDatasetStats target/scala-2.13/repro_2.13-*.jar
  */
object RunDatasetStats {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("RunDatasetStats").getOrCreate()
    val names = Seq("ppi", "author", "german", "wiki", "english", "stack")
    println(Report.datasetStats(names))
    names.foreach { n =>
      val g = repro.expts.Experiments.dataset(n).graph
      val edges = SparkGraph.toDF(spark, g)
      println(s"--- per-layer edge counts ($n), via Spark SQL ---")
      SparkGraph.layerStats(edges).collect().foreach(r => println(s"  layer ${r.get(0)}: ${r.get(1)} edges"))
    }
    spark.stop()
  }
}
