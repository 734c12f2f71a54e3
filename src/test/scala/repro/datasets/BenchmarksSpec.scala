package repro.datasets

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** Generator invariants: label counts match the paper's error mix, labels
  * cover exactly the cells where dirty and clean differ, and generation is
  * deterministic in the seed.
  */
class BenchmarksSpec extends SparkSpec {

  private lazy val hospital = Hospital.generate(spark)
  private lazy val flights  = Flights.generate(spark)
  private lazy val beers    = Beers.generate(spark)
  private lazy val rayyan   = Rayyan.generate(spark)
  private lazy val movies   = Movies.generate(spark)

  private def labelCounts(ds: BenchDataset): Map[String, Long] =
    ds.labels.groupBy("error_type").count().collect().map(r => r.getString(0) -> r.getLong(1)).toMap

  /** Every label points at a cell where dirty ≠ clean, and vice versa. */
  private def assertLabelConsistency(ds: BenchDataset): Unit = {
    val d = repro.eval.Metrics.melt(ds.dirty, ds.keyCol, ds.dataColumns).withColumnRenamed("value", "dv")
    val c = repro.eval.Metrics.melt(ds.clean, ds.keyCol, ds.dataColumns).withColumnRenamed("value", "cv")
    val j = d.join(c, Seq("row_id", "column")).join(ds.labels, Seq("row_id", "column"), "left")
    val mislabeled = j.filter((col("dv") <=> col("cv")) && col("error_type").isNotNull).count()
    val unlabeled  = j.filter(!(col("dv") <=> col("cv")) && col("error_type").isNull).count()
    assert(mislabeled == 0, s"labels on unchanged cells: $mislabeled")
    assert(unlabeled == 0, s"changed cells without labels: $unlabeled")
  }

  // ---- Hospital

  test("hospital has 1000 rows and the declared columns") {
    assert(hospital.dirty.count() == 1000)
    assert(hospital.dirty.columns.toSeq == "row_id" +: Hospital.columns)
  }
  test("hospital error mix tracks Table 2 (typo 213, fd 331, coltype 3000, dmv 227)") {
    val c = labelCounts(hospital)
    assert(c("coltype") == 3000)
    assert(c("dmv") == 227)
    assert(math.abs(c("typo") - 213) <= 25, s"typo=${c("typo")}")
    assert(math.abs(c("fd") - 331) <= 35, s"fd=${c("fd")}")
  }
  test("hospital labels are consistent with the dirty/clean diff") {
    assertLabelConsistency(hospital)
  }
  test("hospital is deterministic in the seed") {
    val again = Hospital.generate(spark)
    assert(again.dirty.collect().toSeq == hospital.dirty.collect().toSeq)
  }
  test("hospital boolean ground truth is the cast representation") {
    assert(hospital.clean.filter("emergency_service IN ('True','False')").count() == 1000)
    assert(hospital.dirty.filter("emergency_service IN ('yes','no')").count() == 1000)
  }

  // ---- Flights

  test("flights has 2376 rows, each flight in 4-6 rows") {
    assert(flights.dirty.count() == 2376)
    val sizes = flights.dirty.groupBy("flight").count().select("count").collect().map(_.getLong(0))
    assert(sizes.forall(s => s >= 1 && s <= 6))
  }
  test("flights errors are time FD jitter plus carrier typos") {
    val c = labelCounts(flights)
    assert(c("fd") > 500, s"fd=${c("fd")}")
    assert(c.getOrElse("typo", 0L) >= 50)
    assert(!c.contains("coltype"))
  }
  test("flights ambiguity: most violating act-time groups lack a 60% majority") {
    import org.apache.spark.sql.expressions.Window
    val g = flights.dirty.groupBy("flight", "act_arr_time").count()
    val w = Window.partitionBy("flight")
    val shares = g.withColumn("tot", sum("count").over(w))
      .withColumn("nvals", count(lit(1)).over(w))
      .filter(col("nvals") > 1)
      .groupBy("flight").agg((max("count") / first("tot")).as("topShare"))
    val ambiguous = shares.filter(col("topShare") < 0.65).count()
    assert(ambiguous > shares.count() * 0.35, "expected a large share of violating groups to be ambiguous")
  }
  test("flights labels are consistent") { assertLabelConsistency(flights) }

  // ---- Beers

  test("beers has 2410 rows and ounce-word inconsistencies") {
    assert(beers.dirty.count() == 2410)
    val c = labelCounts(beers)
    assert(c("inconsistency") == Beers.inconsistencyTarget + Beers.dotVariantTarget)
    assert(c("fd") == Beers.fdTarget)
    assert(c("dmv") == Beers.dmvTarget)
  }
  test("beers inconsistency cells keep the numeric part") {
    val bad = beers.dirty.filter("ounces LIKE '%ounce%'").count()
    assert(bad == Beers.inconsistencyTarget)
  }
  test("beers labels are consistent") { assertLabelConsistency(beers) }

  // ---- Rayyan

  test("rayyan has 1000 rows and the paper's language mix") {
    assert(rayyan.dirty.count() == 1000)
    val eng = rayyan.dirty.filter("article_language = 'eng'").count()
    assert(eng > 350, s"eng=$eng") // dominant code representation
    assert(rayyan.dirty.filter("article_language = 'English'").count() > 50)
  }
  test("rayyan error mix covers typos, language/date inconsistency, fd, dmv, misplacement") {
    val c = labelCounts(rayyan)
    assert(c("typo") >= 300)
    assert(c("inconsistency") >= 200) // language + dates
    assert(c("fd") == 150)
    assert(c("dmv") == 100)
    assert(c("misplacement") == 80)
  }
  test("rayyan titles carry distance-2 bait tokens that are not errors") {
    // They exist in dirty and clean alike (never labelled).
    val labels = rayyan.labels.filter("column = 'article_title'").count()
    val c = labelCounts(rayyan)
    assert(labels == c("typo"))
  }
  test("rayyan labels are consistent") { assertLabelConsistency(rayyan) }

  // ---- Movies

  test("movies has 7390 rows; coltype spans duration and rating columns") {
    assert(movies.dirty.count() == 7390)
    val c = labelCounts(movies)
    assert(c("coltype") == 2 * 7390)
    assert(c("typo") <= Movies.typoTarget && c("typo") >= Movies.typoTarget - 20)
    assert(c("misplacement") == Movies.misplacementTarget)
    assert(c("dmv") == Movies.dmvTarget)
  }
  test("movies misplacements sit beyond the first 1000 rows (sampler blind spot)") {
    val early = movies.labels.filter("error_type = 'misplacement' AND row_id < 1000").count()
    assert(early == 0)
  }
  test("movies duration ground truth is minutes as double text") {
    assert(movies.clean.filter("duration RLIKE '^[0-9]+\\\\.0$'").count() == 7390)
  }
  test("movies labels are consistent") { assertLabelConsistency(movies) }

  test("title vocabulary is invisible to the dictionary corrector") {
    // No movie title token is within distance 2 of the research dictionary —
    // the paper's RetClean scores 0 outside Rayyan.
    import repro.llm.Knowledge
    val tokens = movies.dirty.select("title").distinct().collect()
      .flatMap(_.getString(0).split(" ")).filter(t => t.length >= 5 && t.forall(_.isLetter)).distinct
    val near = tokens.filter(t => Knowledge.dictCandidates(t.toLowerCase, 2).nonEmpty)
    assert(near.isEmpty, s"tokens near dictionary: ${near.take(5).mkString(",")}")
  }
}
