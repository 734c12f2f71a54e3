package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.Harness

/** Reproduces Table 3 (Appendix B): Hospital and Movies scored with
  * column-type and DMV cells *included* as errors.
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("cocoon-table3")
      .config("spark.sql.shuffle.partitions", "16")
      .getOrCreate()
    val scores = for {
      dName <- Harness.table3Datasets
      ds = Harness.dataset(spark, dName)
      sys <- Harness.allSystems()
    } yield {
      val s = Harness.evaluate(spark, ds, sys, Set.empty)
      println("[table3] " + s.row)
      s
    }
    println()
    println("Table 3: performance with column-type and DMV errors included")
    println(Harness.formatTable(scores, Harness.table3Datasets))
    spark.stop()
  }
}
