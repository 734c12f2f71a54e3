package repro.bench

import repro.SparkSpec
import repro.eval.{Harness, Scores}

/** Reproduces Table 3 (Appendix B): Hospital and Movies with column-type and
  * DMV cells counted as errors. Shape asserted:
  *   - Cocoon >0.9 F1 on both (it casts types and nulls DMVs);
  *   - Raha+Baran close behind on Hospital (bool cast learned from labels)
  *     but well behind on Movies (duration arithmetic defeats its rules);
  *   - HoloClean recall collapses (constraints say nothing about casts);
  *   - CleanAgent and RetClean stay at zero.
  */
class Table3Bench extends SparkSpec {

  private lazy val scores: Seq[Scores] = {
    val rows = for {
      dName <- Harness.table3Datasets
      ds = Harness.dataset(spark, dName)
      sys <- Harness.allSystems()
    } yield {
      val s = Harness.evaluate(spark, ds, sys, Set.empty)
      info(s.row)
      s
    }
    println("\n=== Table 3 (reproduced): P/R/F1 with coltype & DMV included ===")
    println(Harness.formatTable(rows, Harness.table3Datasets))
    rows
  }

  private def get(system: String, dataset: String): Scores =
    scores.find(s => s.system == system && s.dataset == dataset).get

  test("the grid is complete: 5 systems × 2 datasets") {
    assert(scores.size == 10)
  }

  test("Cocoon exceeds 0.9 F1 on both benchmarks (paper: 0.99, 0.93)") {
    assert(get("Cocoon", "hospital").f1 > 0.9, get("Cocoon", "hospital").row)
    assert(get("Cocoon", "movies").f1 > 0.9, get("Cocoon", "movies").row)
  }

  test("Cocoon outperforms every baseline on both datasets") {
    for (d <- Harness.table3Datasets; s <- scores if s.dataset == d && s.system != "Cocoon")
      assert(get("Cocoon", d).f1 >= s.f1, s.row)
  }

  test("Raha+Baran fixes the boolean casts on Hospital (paper: 0.98 F1)") {
    assert(get("Raha+Baran", "hospital").f1 > 0.8, get("Raha+Baran", "hospital").row)
  }

  test("Raha+Baran trails on Movies: duration arithmetic defeats suffix rules (paper: 0.56)") {
    val rb = get("Raha+Baran", "movies")
    assert(rb.f1 < get("Cocoon", "movies").f1 - 0.15, rb.row)
  }

  test("HoloClean recall collapses when cast errors count (paper: 0.13 / 0.00)") {
    assert(get("HoloClean", "hospital").recall < 0.2, get("HoloClean", "hospital").row)
    assert(get("HoloClean", "movies").f1 < 0.05, get("HoloClean", "movies").row)
  }

  test("CleanAgent and RetClean remain at ~zero") {
    for (sys <- Seq("CleanAgent", "RetClean"); d <- Harness.table3Datasets)
      assert(get(sys, d).f1 < 0.05, get(sys, d).row)
  }
}
