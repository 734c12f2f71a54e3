package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.{Harness, Metrics}

/** Reproduces Table 1: P/R/F1 of all five systems on all five benchmarks,
  * under the paper's Table-1 rules (column-type and DMV cells excluded).
  *
  * Usage: spark-submit ... repro.jobs.Table1Job [datasetFilter] [systemFilter]
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("cocoon-table1")
      .config("spark.sql.shuffle.partitions", "16")
      .getOrCreate()
    val datasets = Harness.table1Datasets.filter(d => args.lift(0).forall(d.contains))
    val systems  = Harness.allSystems().filter(s => args.lift(1).forall(s.name.toLowerCase.contains))
    val scores = for {
      dName <- datasets
      ds = Harness.dataset(spark, dName)
      sys <- systems
    } yield {
      val s = Harness.evaluate(spark, ds, sys, Metrics.table1Excluded)
      println("[table1] " + s.row)
      s
    }
    println()
    println("Table 1: data cleaning performance (coltype/DMV excluded)")
    println(Harness.formatTable(scores, datasets))
    spark.stop()
  }
}
