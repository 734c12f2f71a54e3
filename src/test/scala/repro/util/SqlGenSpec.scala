package repro.util

import org.scalatest.funsuite.AnyFunSuite

class SqlGenSpec extends AnyFunSuite {

  test("lit quotes a plain string") { assert(SqlGen.lit("abc") == "'abc'") }
  test("lit doubles embedded single quotes") { assert(SqlGen.lit("O'Hare") == "'O''Hare'") }
  test("lit renders null as NULL") { assert(SqlGen.lit(null) == "NULL") }
  test("ident backtick-quotes") { assert(SqlGen.ident("col") == "`col`") }
  test("ident escapes backticks") { assert(SqlGen.ident("a`b") == "`a``b`") }
  test("identAnsi double-quotes") { assert(SqlGen.identAnsi("col") == "\"col\"") }
  test("identAnsi escapes double quotes") { assert(SqlGen.identAnsi("a\"b") == "\"a\"\"b\"") }

  test("caseWhenMap with empty mapping is the bare column") {
    assert(SqlGen.caseWhenMap("c", Seq.empty) == "`c`")
  }
  test("caseWhenMap renders WHEN/THEN pairs and ELSE") {
    val sql = SqlGen.caseWhenMap("c", Seq("bad" -> "good"))
    assert(sql == "CASE WHEN `c` = 'bad' THEN 'good' ELSE `c` END")
  }
  test("caseWhenMap renders multiple mappings in order") {
    val sql = SqlGen.caseWhenMap("c", Seq("a" -> "b", "x" -> "y"))
    assert(sql.indexOf("'a'") < sql.indexOf("'x'"))
  }
  test("caseWhenMap maps to NULL when target is null") {
    assert(SqlGen.caseWhenMap("c", Seq("bad" -> null)).contains("THEN NULL"))
  }
  test("caseWhenNull renders IN list") {
    val sql = SqlGen.caseWhenNull("c", Seq("N/A", "-"))
    assert(sql == "CASE WHEN `c` IN ('N/A', '-') THEN NULL ELSE `c` END")
  }
  test("caseWhenNull with no values is the bare column") {
    assert(SqlGen.caseWhenNull("c", Seq.empty) == "`c`")
  }
  test("caseWhenRange with both bounds") {
    val sql = SqlGen.caseWhenRange("c", Some(0.0), Some(10.0))
    assert(sql.contains("< 0.0") && sql.contains("> 10.0") && sql.contains("THEN NULL"))
  }
  test("caseWhenRange with only an upper bound") {
    val sql = SqlGen.caseWhenRange("c", None, Some(5.0))
    assert(!sql.contains("<") && sql.contains("> 5.0"))
  }
  test("caseWhenRange with no bounds is the bare column") {
    assert(SqlGen.caseWhenRange("c", None, None) == "`c`")
  }
  test("comment flattens newlines") {
    assert(SqlGen.comment("a\nb") == "-- a b")
  }
  test("caseWhenMap honours a custom quote dialect") {
    val sql = SqlGen.caseWhenMap("c", Seq("bad" -> "good"), SqlGen.identAnsi)
    assert(sql.contains("\"c\"") && !sql.contains("`"))
  }
}
