package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Pattern._
import scala.util.Random

/** Aggregator internals: space complexity claims (Theorems 4.2/5.2/6.3),
  * predicate classification (Theorem 5.1), and edge cases. */
class AggregatorSpec extends AnyFunSuite {

  private val P = plus(seq(plus(tp("A")), tp("B")))

  test("type-grained space is Θ(l) regardless of stream length (Theorem 4.2)") {
    val q = TrendQuery.local(P, Semantics.ANY)
    val agg = new TypeGrained(q)
    val r = new Random(1)
    (1 to 5000).foreach(i => agg.onEvent(Ev(i.toLong, i.toLong,
      if (r.nextBoolean()) "A" else "B", "g", 1.0)))
    assert(agg.peakUnits == 2) // one aggregate per type in the pattern
  }

  test("pattern-grained space is O(1) (Theorem 6.3)") {
    val q = TrendQuery.local(P, Semantics.NEXT)
    val agg = new PatternGrained(q)
    (1 to 5000).foreach(i => agg.onEvent(Ev(i.toLong, i.toLong,
      if (i % 3 == 0) "B" else "A", "g", 1.0)))
    assert(agg.peakUnits == 2) // final aggregate + last matched event
  }

  test("mixed-grained space is Θ(t + n_e): only restricted-type events stored (Theorem 5.2)") {
    val q = TrendQuery.local(P, Semantics.ANY, Seq(AdjPred.Cmp("B", "A", "<")))
    val agg = new MixedGrained(q)
    var bCount = 0
    (1 to 200).foreach { i =>
      val t = if (i % 4 == 0) "B" else "A"
      if (t == "B") bCount += 1
      agg.onEvent(Ev(i.toLong, i.toLong, t, "g", i.toDouble))
    }
    // |T_t| + stored b's + running final = 1 + n_B + 1
    assert(agg.peakUnits == 1 + bCount + 1)
  }

  test("classifier: no predicates -> all types type-grained") {
    val q = TrendQuery.local(P, Semantics.ANY)
    val agg = new MixedGrained(q)
    assert(agg.eventGrained.isEmpty && agg.typeGrained == Set("A", "B"))
  }

  test("classifier: predicate on (A,A) adjacency makes A event-grained") {
    val q = TrendQuery.local(P, Semantics.ANY, Seq(AdjPred.Cmp("A", "A", "<")))
    val agg = new MixedGrained(q)
    assert(agg.eventGrained == Set("A") && agg.typeGrained == Set("B"))
  }

  test("classifier: predicate whose prev type never precedes the next type is ignored") {
    // SEQ(A+,B): B is not a predecessor of A, so a (B,A) predicate cannot
    // restrict any adjacency (Theorem 5.1's E ∈ predTypes(E_x) condition)
    val q = TrendQuery.local(seq(plus(tp("A")), tp("B")), Semantics.ANY,
      Seq(AdjPred.Cmp("B", "A", "<")))
    val agg = new MixedGrained(q)
    assert(agg.eventGrained.isEmpty)
  }

  test("classifier extreme: predicates on every adjacency -> fully event-grained (GRETA case)") {
    val q = TrendQuery.local(P, Semantics.ANY,
      Seq(AdjPred.Cmp("A", "A", "<"), AdjPred.Cmp("B", "A", "<"), AdjPred.Cmp("A", "B", "<")))
    val agg = new MixedGrained(q)
    assert(agg.typeGrained.isEmpty)
  }

  test("mixed-grained with no predicates degenerates to type-grained results") {
    val r = new Random(3)
    val evs = Vector.tabulate(60)(i => Ev(i + 1L, i + 1L,
      if (r.nextBoolean()) "A" else "B", "g", r.nextInt(10).toDouble))
    val qt = TrendQuery.local(P, Semantics.ANY)
    val tg = new TypeGrained(qt); val mg = new MixedGrained(qt)
    evs.foreach(tg.onEvent); evs.foreach(mg.onEvent)
    assert(tg.result == mg.result)
  }

  test("irrelevant event types are skipped under ANY (type + mixed)") {
    val q = TrendQuery.local(P, Semantics.ANY)
    val agg = new TypeGrained(q)
    Seq(Ev(1, "A"), Ev(2, "Z"), Ev(3, "B")).foreach(agg.onEvent)
    assert(agg.result.count == 1.0)
  }

  test("pattern-grained rejects ANY queries (Table 4)") {
    assertThrows[IllegalArgumentException] {
      new PatternGrained(TrendQuery.local(P, Semantics.ANY))
    }
  }

  test("empty stream yields zero aggregates at every granularity") {
    assert(new TypeGrained(TrendQuery.local(P, Semantics.ANY)).result == Agg.zero)
    assert(new MixedGrained(TrendQuery.local(P, Semantics.ANY,
      Seq(AdjPred.Cmp("A", "A", "<")))).result == Agg.zero)
    assert(new PatternGrained(TrendQuery.local(P, Semantics.CONT)).result == Agg.zero)
  }

  test("single end-type event with no start is not a trend") {
    val q = TrendQuery.local(seq(plus(tp("A")), tp("B")), Semantics.ANY)
    val agg = new TypeGrained(q)
    agg.onEvent(Ev(1, "B"))
    assert(agg.result.count == 0.0)
  }

  test("single start-type event of a one-type pattern is a trend (induction basis)") {
    val q = TrendQuery.local(plus(tp("A")), Semantics.ANY, Nil, Some("A"))
    val agg = new TypeGrained(q)
    agg.onEvent(Ev(1, "A", 7.0))
    assert(agg.result == Agg(1, 1, 7.0, 7.0, 7.0))
  }

  test("target type other than the end type aggregates correctly (Table 8 E≠end)") {
    val q = TrendQuery.local(seq(plus(tp("A")), tp("B")), Semantics.ANY, Nil, Some("A"))
    val agg = new TypeGrained(q)
    Seq(Ev(1, "A", 2.0), Ev(2, "A", 4.0), Ev(3, "B", 100.0)).foreach(agg.onEvent)
    // trends: (a1,b) (a2,b) (a1,a2,b): countE=4, sum=2+4+6=12, min=2, max=4
    assert(agg.result == Agg(3, 4, 12.0, 2.0, 4.0))
  }

  test("CONT reset also clears the aggregate bundle, not just the count") {
    val q = TrendQuery.local(plus(tp("M")), Semantics.CONT, Nil, Some("M"))
    val agg = new PatternGrained(q)
    Seq(Ev(1, "M", 5.0), Ev(2, "Z", 0.0), Ev(3, "M", 9.0)).foreach(agg.onEvent)
    // trends: (m1) before the break, (m3) after; never (m1,m3)
    assert(agg.result == Agg(2, 2, 14.0, 5.0, 9.0))
  }
}
