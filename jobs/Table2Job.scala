package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.eval.Harness

/** Reproduces Table 2: distribution of error types across the Hospital and
  * Movies benchmarks, counted from the generators' cell labels.
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("cocoon-table2")
      .config("spark.sql.shuffle.partitions", "16")
      .getOrCreate()
    println("Table 2: distribution of error types (paper: Hospital 1000x19, Movies 7390x17)")
    for (name <- Seq("hospital", "movies")) {
      val ds = Harness.dataset(spark, name)
      val rows = ds.dirty.count()
      val cols = ds.dataColumns.size + 1
      val counts = ds.labels.groupBy("error_type").agg(count(lit(1)).as("n"))
        .collect().map(r => r.getString(0) -> r.getLong(1)).toMap
      val line = Seq("typo", "fd", "coltype", "inconsistency", "dmv", "misplacement")
        .map(t => s"$t=${counts.getOrElse(t, 0L)}").mkString(" ")
      println(f"[table2] $name%-9s size=${rows}x$cols $line")
    }
    spark.stop()
  }
}
