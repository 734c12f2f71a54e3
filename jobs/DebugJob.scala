package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.core.{CocoonConfig, CocoonPipeline, MapValues, MapToNull, FdRepair, RangeClamp}
import repro.eval.{Harness, Metrics}
import repro.llm.SimulatedLLM

/** Diagnostic entrypoint: runs Cocoon on one benchmark, prints each step's
  * rewrites, and breaks wrong changes down by column.
  */
object DebugJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("cocoon-debug")
      .config("spark.sql.shuffle.partitions", "16")
      .getOrCreate()
    val ds = Harness.dataset(spark, args.headOption.getOrElse("hospital"))
    val res = CocoonPipeline.run(spark, ds.dirty, new SimulatedLLM(), CocoonConfig(keyCol = ds.keyCol, tableDesc = ds.name))
    res.steps.foreach { st =>
      st.rewrites.foreach { rw =>
        val size = rw.rewrite match {
          case MapValues(m)  => s"map(${m.size})"
          case MapToNull(v)  => s"null(${v.size})"
          case FdRepair(c)   => s"fd(${c.size})"
          case RangeClamp(a, b) => s"clamp($a,$b)"
        }
        println(s"[debug] step=${st.issue} col=${rw.column} $size")
      }
    }
    // Wrong changes by column (on the Table-1 considered cells).
    val d = Metrics.melt(ds.dirty, ds.keyCol, ds.dataColumns).withColumnRenamed("value", "dv")
    val c = Metrics.melt(ds.clean, ds.keyCol, ds.dataColumns).withColumnRenamed("value", "cv")
    val o = Metrics.melt(res.cleaned, ds.keyCol, ds.dataColumns).withColumnRenamed("value", "ov")
    val j = d.join(c, Seq("row_id", "column")).join(o, Seq("row_id", "column"))
      .join(ds.labels, Seq("row_id", "column"), "left")
      .filter(col("error_type").isNull || !col("error_type").isin("coltype", "dmv"))
      .filter(!(col("ov") <=> col("dv")) && !(col("ov") <=> col("cv")))
    j.groupBy("column", "error_type").agg(count(lit(1)).as("wrong"))
      .orderBy(desc("wrong")).collect()
      .foreach(r => println(s"[debug] wrong col=${r.get(0)} label=${r.get(1)} n=${r.get(2)}"))
    j.select("column", "dv", "cv", "ov").limit(12).collect()
      .foreach(r => println(s"[debug] ex col=${r.get(0)} dirty=${r.get(1)} clean=${r.get(2)} out=${r.get(3)}"))
    spark.stop()
  }
}
