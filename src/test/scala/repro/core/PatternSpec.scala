package repro.core

import org.scalatest.funsuite.AnyFunSuite
import Pattern._

/** Pattern AST + FSA analysis (paper §3.1, Figure 4). */
class PatternSpec extends AnyFunSuite {

  test("Figure 4: (SEQ(A+,B))+ has start A, end B, predTypes A={A,B}, B={A}") {
    val info = PatternAnalyzer.analyze(plus(seq(plus(tp("A")), tp("B"))))
    assert(info.start == "A")
    assert(info.end == "B")
    assert(info.preds("A") == Set("A", "B"))
    assert(info.preds("B") == Set("A"))
    assert(info.types == Vector("A", "B"))
  }

  test("q1 pattern M+: start=end=M, M self-loop") {
    val info = PatternAnalyzer.analyze(plus(tp("M")))
    assert(info.start == "M" && info.end == "M")
    assert(info.preds("M") == Set("M"))
  }

  test("q3 pattern SEQ(A+,B+): A self-loop, B preceded by A and B") {
    val info = PatternAnalyzer.analyze(seq(plus(tp("A")), plus(tp("B"))))
    assert(info.start == "A" && info.end == "B")
    assert(info.preds("A") == Set("A"))
    assert(info.preds("B") == Set("A", "B"))
  }

  test("q2 pattern SEQ(Accept,(SEQ(Call,Cancel))+,Finish)") {
    val p = seq(tp("Accept"), plus(seq(tp("Call"), tp("Cancel"))), tp("Finish"))
    val info = PatternAnalyzer.analyze(p)
    assert(info.start == "Accept" && info.end == "Finish")
    assert(info.preds("Call") == Set("Accept", "Cancel"))
    assert(info.preds("Cancel") == Set("Call"))
    assert(info.preds("Finish") == Set("Cancel"))
    assert(info.preds("Accept") == Set.empty[String])
    assert(p.length == 4)
  }

  test("plain sequence SEQ(A,B,C): chain predecessors, no loops") {
    val info = PatternAnalyzer.analyze(seq(tp("A"), tp("B"), tp("C")))
    assert(info.preds("A").isEmpty)
    assert(info.preds("B") == Set("A"))
    assert(info.preds("C") == Set("B"))
  }

  test("nested Kleene SEQ(A,(SEQ(B+,C))+): loop back from C to B") {
    val info = PatternAnalyzer.analyze(seq(tp("A"), plus(seq(plus(tp("B")), tp("C")))))
    assert(info.start == "A" && info.end == "C")
    assert(info.preds("B") == Set("A", "B", "C"))
    assert(info.preds("C") == Set("B"))
  }

  test("single type pattern A") {
    val info = PatternAnalyzer.analyze(tp("A"))
    assert(info.start == "A" && info.end == "A" && info.preds("A").isEmpty)
  }

  test("duplicate event types are rejected (paper §2.1 assumption)") {
    assertThrows[IllegalArgumentException] {
      PatternAnalyzer.analyze(seq(plus(tp("A")), tp("B"), tp("A")))
    }
  }

  test("render is human-readable") {
    assert(plus(seq(plus(tp("A")), tp("B"))).render == "(SEQ((A)+, B))+")
  }

  test("pattern length counts event types (Definition 1)") {
    assert(plus(seq(plus(tp("A")), tp("B"))).length == 2)
    assert(tp("A").length == 1)
  }
}
