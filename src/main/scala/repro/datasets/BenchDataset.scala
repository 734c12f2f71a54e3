package repro.datasets

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import scala.collection.mutable

/** One benchmark: a dirty table, its ground-truth clean version, and
  * cell-level error labels.
  *
  * `labels` has schema (row_id LONG, column STRING, error_type STRING) and
  * covers exactly the cells where dirty ≠ clean (null-safe). Error types:
  * typo, fd, inconsistency, coltype, dmv, misplacement. `fdConstraints` are
  * the ground-truth denial constraints handed to HoloClean, as in the paper.
  */
final case class BenchDataset(
    name: String,
    dirty: DataFrame,
    clean: DataFrame,
    labels: DataFrame,
    dataColumns: Seq[String],
    fdConstraints: Seq[(String, String)],
    keyCol: String = "row_id",
)

object BenchDataset {

  /** Column-major builder for a synthetic dirty/clean pair. Fill ground truth
    * with [[TableBuilder.setBoth]]; introduce an error with
    * [[TableBuilder.setCell]], which records the label. Deterministic given
    * the caller's seeded Random.
    */
  final class TableBuilder(val columns: Seq[String], val n: Int) {
    val truth: Array[Array[String]] = Array.ofDim[String](n, columns.size)
    val dirty: Array[Array[String]] = Array.ofDim[String](n, columns.size)
    private val labels  = mutable.ListBuffer.empty[(Long, String, String)]
    private val labeled = mutable.Set.empty[(Int, Int)]
    private val colIdx  = columns.zipWithIndex.toMap

    def ci(c: String): Int = colIdx(c)

    def setBoth(r: Int, c: String, v: String): Unit = {
      truth(r)(ci(c)) = v; dirty(r)(ci(c)) = v
    }

    def cleanValue(r: Int, c: String): String = truth(r)(ci(c))
    def dirtyValue(r: Int, c: String): String = dirty(r)(ci(c))
    def isLabeled(r: Int, c: String): Boolean = labeled((r, ci(c)))

    /** Set a cell's dirty and clean values; label it if they differ.
      * Returns true iff a label was recorded.
      */
    def setCell(r: Int, c: String, dirtyV: String, cleanV: String, errType: String): Boolean = {
      val i = ci(c)
      dirty(r)(i) = dirtyV
      truth(r)(i) = cleanV
      val differs = (dirtyV == null) != (cleanV == null) || (dirtyV != null && dirtyV != cleanV)
      if (differs && !labeled((r, i))) {
        labeled += ((r, i))
        labels += ((r.toLong, c, errType))
      }
      differs
    }

    def labelCount(errType: String): Int = labels.count(_._3 == errType)

    def build(spark: SparkSession, name: String, fds: Seq[(String, String)]): BenchDataset = {
      val schema = StructType(
        StructField("row_id", LongType, nullable = false) +:
          columns.map(c => StructField(c, StringType, nullable = true))
      )
      def df(arr: Array[Array[String]]): DataFrame = {
        val rows = arr.zipWithIndex.map { case (r, i) => Row.fromSeq(i.toLong +: r.toSeq) }
        spark.createDataFrame(spark.sparkContext.parallelize(rows.toIndexedSeq, 4), schema)
      }
      val labelSchema = StructType(Seq(
        StructField("row_id", LongType, nullable = false),
        StructField("column", StringType, nullable = false),
        StructField("error_type", StringType, nullable = false),
      ))
      val labelRows = labels.toSeq.map { case (r, c, t) => Row(r, c, t) }
      val labelDf = spark.createDataFrame(spark.sparkContext.parallelize(labelRows, 2), labelSchema)
      BenchDataset(name, df(dirty), df(truth), labelDf, columns, fds)
    }
  }
}
