package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Aggregate bundle algebra (the Σ and extension operations of Table 8). */
class AggSpec extends AnyFunSuite {

  private def randAgg(r: Random): Agg = {
    val c = r.nextInt(100)
    if (c == 0) Agg.zero
    else {
      val mn = r.nextDouble() * 100 - 50
      val mx = mn + r.nextDouble() * 50
      Agg(c, r.nextInt(100), r.nextDouble() * 200 - 100, mn, mx)
    }
  }

  private def samples(seed: Int, n: Int = 200): Seq[Agg] = {
    val r = new Random(seed)
    Seq.fill(n)(randAgg(r))
  }

  test("zero is the identity of merge") {
    samples(1).foreach { a =>
      assert(Agg.merge(a, Agg.zero) == a)
      assert(Agg.merge(Agg.zero, a) == a)
    }
  }

  test("merge is commutative") {
    val r = new Random(2)
    for (_ <- 1 to 200) {
      val (a, b) = (randAgg(r), randAgg(r))
      assert(Agg.merge(a, b) == Agg.merge(b, a))
    }
  }

  test("merge is associative") {
    val r = new Random(3)
    for (_ <- 1 to 200) {
      val (a, b, c) = (randAgg(r), randAgg(r), randAgg(r))
      val l = Agg.merge(Agg.merge(a, b), c)
      val rr = Agg.merge(a, Agg.merge(b, c))
      assert(math.abs(l.count - rr.count) < 1e-9 && math.abs(l.sum - rr.sum) < 1e-9 &&
        l.min == rr.min && l.max == rr.max)
    }
  }

  test("extend of zero is zero (no trends to extend)") {
    assert(Agg.extend(Agg.zero, 42.0, isTarget = true) == Agg.zero)
  }

  test("extend by a non-target event changes nothing (Table 8 x-rows)") {
    samples(4).foreach { a => assert(Agg.extend(a, 7.0, isTarget = false) == a) }
  }

  test("extend startUnit by a target event yields a singleton trend") {
    assert(Agg.extend(Agg.startUnit, 5.0, isTarget = true) == Agg(1, 1, 5.0, 5.0, 5.0))
  }

  test("extend adds one target event per trend: countE += count, sum += v*count") {
    val r = new Random(5)
    for (_ <- 1 to 200) {
      val a = randAgg(r)
      val v = r.nextDouble() * 20 - 10
      val e = Agg.extend(a, v, isTarget = true)
      if (!a.isZero) {
        assert(e.count == a.count)
        assert(e.countE == a.countE + a.count)
        assert(math.abs(e.sum - (a.sum + v * a.count)) < 1e-6)
        assert(e.min == math.min(a.min, v) && e.max == math.max(a.max, v))
      }
    }
  }

  test("avg = sum / countE; NaN when no target events") {
    assert(Agg(2, 4, 12, 1, 5).avg == 3.0)
    assert(Agg.startUnit.avg.isNaN)
  }

  test("startUnit represents one empty trend") {
    assert(Agg.startUnit.count == 1 && Agg.startUnit.countE == 0 &&
      Agg.startUnit.min.isPosInfinity && Agg.startUnit.max.isNegInfinity)
  }
}
