package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SummarizeSpec extends AnyFunSuite {

  test("a dominant pattern is found (the paper's Associate-degree case)") {
    val targets = (0 until 12).map(i => Map("Degree" -> "Associate", "Major" -> s"m$i")) ++
      Seq(Map("Degree" -> "B.S.", "Major" -> "odd one"))
    val others = (0 until 50).map(i => Map("Degree" -> "B.S.", "Major" -> s"x$i"))
    val s = Summarize.summarize(targets, others)
    assert(s.patterns.exists(p => p.attr == "Degree" && p.value == "Associate"))
    assert(s.size < targets.size, "summarization must compress")
  }

  test("patterns covering many non-targets are penalized") {
    val targets = (0 until 3).map(i => Map("a" -> "v", "id" -> s"t$i"))
    val others = (0 until 100).map(i => Map("a" -> "v", "id" -> s"o$i"))
    val s = Summarize.summarize(targets, others)
    assert(!s.patterns.exists(p => p.attr == "a" && p.value == "v"))
    assert(s.uncovered == 3)
  }

  test("empty target set yields empty summary") {
    val s = Summarize.summarize(Seq.empty, Seq.empty)
    assert(s.patterns.isEmpty && s.uncovered == 0 && s.size == 0)
  }

  test("multiple disjoint patterns are all found") {
    val targets =
      (0 until 6).map(i => Map("g" -> "red", "id" -> s"r$i")) ++
        (0 until 5).map(i => Map("g" -> "blue", "id" -> s"b$i"))
    val s = Summarize.summarize(targets, Seq.empty)
    assert(s.patterns.map(p => p.value).toSet == Set("red", "blue"))
    assert(s.size == 2)
  }

  test("maxPatterns caps the pattern count") {
    val targets = (0 until 40).map(i => Map("g" -> s"v${i / 2}", "id" -> s"t$i"))
    val s = Summarize.summarize(targets, Seq.empty, maxPatterns = 5)
    assert(s.patterns.size <= 5)
  }
}
