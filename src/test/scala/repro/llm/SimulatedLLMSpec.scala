package repro.llm

import org.scalatest.funsuite.AnyFunSuite
import repro.profile.ValueCount

class SimulatedLLMSpec extends AnyFunSuite {
  private val llm = new SimulatedLLM()

  private def vc(pairs: (String, Long)*): Seq[ValueCount] = pairs.map { case (v, n) => ValueCount(v, n) }

  // ---- string outliers (Figure 2 / Figure 3 prompts)

  test("detects a rare edit-distance-1 variant of a frequent value as a typo") {
    val values = vc("Birmingham" -> 25, "Birmxngham" -> 1)
    val review = llm.reviewStringOutliers("city", values)
    assert(review.unusual && review.unusualValues == Seq("Birmxngham"))
  }

  test("maps the typo to the frequent value") {
    val values = vc("Birmingham" -> 25, "Birmxngham" -> 1)
    val m = llm.proposeStringMapping("city", Seq("Birmxngham"), values)
    assert(m == Map("Birmxngham" -> "Birmingham"))
  }

  test("does not flag balanced frequent values") {
    val review = llm.reviewStringOutliers("city", vc("Boston" -> 50, "Denver" -> 45))
    assert(!review.unusual)
  }

  test("requires a clear frequency ratio before calling something a typo") {
    // 2:1 is not enough evidence (both could be legitimate).
    val review = llm.reviewStringOutliers("c", vc("Dothan" -> 2, "Dothxn" -> 1))
    assert(!review.unusual)
  }

  test("digit-only differences are not typos (the Flights times rule)") {
    val values = vc("10:30 p.m." -> 20, "10:31 p.m." -> 1)
    assert(!llm.reviewStringOutliers("act_arr_time", values).unusual)
  }

  test("ambiguous multi-candidate typos are left alone") {
    // Equidistant frequent candidates: the LLM cannot commit.
    val values = vc("AMI-1" -> 50, "AMX-1" -> 50, "AMx-2" -> 1, "AMI-2" -> 50)
    val m = llm.proposeStringMapping("code", Seq("AMx-2"), values)
    assert(!m.contains("AMx-2") || m("AMx-2") == "AMI-2")
  }

  test("the Rayyan language example: English maps to the dominant code eng") {
    val values = vc("eng" -> 464, "English" -> 95, "fre" -> 120, "French" -> 20)
    val review = llm.reviewStringOutliers("article_language", values)
    assert(review.unusualValues.contains("English") && review.unusualValues.contains("French"))
    val m = llm.proposeStringMapping("article_language", review.unusualValues, values)
    assert(m("English") == "eng" && m("French") == "fre")
  }

  test("dictionary typo in a unique title is fixed with capitalization preserved") {
    val values = vc("Tretment of chronic disease" -> 1)
    val m = llm.proposeStringMapping("title", Seq("Tretment of chronic disease"), values)
    assert(m("Tretment of chronic disease") == "Treatment of chronic disease")
  }

  test("legitimately unusual tokens (distance 2) are not touched") {
    val v = "study of treatmentux"
    assert(llm.proposeStringMapping("title", Seq(v), vc(v -> 1)).isEmpty)
  }

  // ---- patterns (§2.1.2)

  test("recognises mixed duration formats") {
    val values = vc("100 min" -> 90, "1 hr 40 min" -> 10)
    val r = llm.reviewPatterns("duration", values)
    assert(r.exists(_.familyName == "duration"))
    assert(r.get.formatShares == Map("min" -> 90L, "hr-min" -> 10L))
  }

  test("recognises mixed date formats") {
    val values = vc("1/5/2009" -> 80, "2009-01-05" -> 20)
    assert(llm.reviewPatterns("created_at", values).exists(_.familyName == "date"))
  }

  test("uniform formats are not flagged as pattern outliers") {
    assert(llm.reviewPatterns("duration", vc("100 min" -> 100)).isEmpty)
  }

  test("free text is not pattern-matched") {
    assert(llm.reviewPatterns("title", vc("study of stroke" -> 5, "risk factors" -> 3)).isEmpty)
  }

  // ---- DMV (§2.1.3)

  test("identifies disguised missing values") {
    val values = vc("72" -> 50, "N/A" -> 5, "null" -> 2, "85" -> 40)
    assert(llm.identifyDmv("score", values).toSet == Set("N/A", "null"))
  }

  test("no DMV in clean numeric values") {
    assert(llm.identifyDmv("score", vc("72" -> 50, "85" -> 40)).isEmpty)
  }

  // ---- column type (§2.1.4)

  test("suggests BOOLEAN for yes/no columns") {
    val s = llm.suggestType("emergency_service", "string", vc("yes" -> 600, "no" -> 400))
    assert(s.exists(t => t.targetType == "BOOLEAN" && t.rewriteKind == "boolean"))
  }

  test("suggests DOUBLE minutes for duration columns") {
    val s = llm.suggestType("duration", "string", vc("100 min" -> 90, "2 hr" -> 10))
    assert(s.exists(_.rewriteKind == "duration-minutes"))
  }

  test("suggests a numeric cast for pure numeric text") {
    val s = llm.suggestType("year", "string", vc("1994" -> 10, "2001" -> 15))
    assert(s.exists(_.rewriteKind == "numeric-cast"))
  }

  test("suggests a rating cast for x/10 columns") {
    val s = llm.suggestType("rating", "string", vc("7.5/10" -> 99, "8.1/10" -> 88))
    assert(s.exists(_.rewriteKind == "rating-number"))
  }

  test("mixed text columns keep their type") {
    assert(llm.suggestType("name", "string", vc("Boston General" -> 5, "Denver Memorial" -> 5)).isEmpty)
  }

  // ---- numeric range (§2.1.5)

  test("flags a range outside semantic bounds") {
    assert(llm.reviewNumericRange("age", -5, 40).contains((0.0, 125.0)))
    assert(llm.reviewNumericRange("age", 0, 999).contains((0.0, 125.0)))
  }
  test("accepts in-range values") {
    assert(llm.reviewNumericRange("age", 0, 95).isEmpty)
  }

  // ---- FD (§2.1.6)

  test("FD meaningfulness delegates to column-name semantics") {
    assert(llm.reviewFdMeaningful("zip", "city"))
    assert(!llm.reviewFdMeaningful("score", "city"))
  }

  test("resolves a confident-majority FD group") {
    val r = llm.resolveFdGroup("provider_id", "city", "10004", vc("Dothan" -> 18, "Boston" -> 2))
    assert(r.contains("Dothan"))
  }

  test("declines an ambiguous FD group (the Flights behaviour)") {
    val r = llm.resolveFdGroup("flight", "act_arr_time", "AA-1733",
      vc("10:30 p.m." -> 5, "10:31 p.m." -> 4, "10:28 p.m." -> 3, "10:39 p.m." -> 1))
    assert(r.isEmpty)
  }

  test("the majority threshold separates 0.6-plurality traps from real majorities") {
    // 3-of-5 (0.6) is exactly the wrong-plurality trap share — declined.
    assert(llm.resolveFdGroup("f", "t", "x", vc("a" -> 3, "b" -> 2)).isEmpty)
    // 7-of-10 (0.7) is a confident majority — committed.
    assert(llm.resolveFdGroup("f", "t", "x", vc("a" -> 7, "b" -> 3)).contains("a"))
  }

  test("tiny FD groups are declined regardless of share") {
    assert(llm.resolveFdGroup("f", "t", "x", vc("a" -> 2, "b" -> 1)).isEmpty)
  }

  // ---- duplication / uniqueness (§2.1.7–8)

  test("duplication acceptable in log-like tables, erroneous otherwise") {
    assert(llm.duplicationAcceptable("event log", 50, 1000))
    assert(!llm.duplicationAcceptable("customers", 50, 1000))
  }

  test("key-like near-unique columns should be unique") {
    assert(llm.shouldBeUnique("beer_id", 0.99))
    assert(!llm.shouldBeUnique("city", 0.99))
    assert(!llm.shouldBeUnique("beer_id", 0.5))
  }
}
