package repro.eval

import org.scalatest.funsuite.AnyFunSuite

import repro.util.BitVector

class FprEvalSpec extends AnyFunSuite {

  private def q(kmer: String, truthBits: Seq[Int], n: Int) =
    Workload.Query(kmer, BitVector.of(n, truthBits))

  test("perfect answers: zero FP, zero FN") {
    val n = 10
    val qs = Seq(q("a", Seq(1, 2), n), q("b", Seq.empty, n))
    val r = FprEval.evaluate(k => if (k == "a") BitVector.of(n, Seq(1, 2)) else BitVector.empty(n), qs, n)
    assert(r.falsePositives == 0 && r.falseNegatives == 0)
    assert(r.totalPositives == 2 && r.totalNegatives == 18)
    assert(r.fpRate == 0.0)
  }

  test("counts false positives per (query, file) pair") {
    val n = 10
    val qs = Seq(q("a", Seq(1), n))
    val r = FprEval.evaluate(_ => BitVector.of(n, Seq(1, 3, 4)), qs, n)
    assert(r.falsePositives == 2)
    assert(r.totalNegatives == 9)
    assert(math.abs(r.fpRate - 2.0 / 9) < 1e-12)
    assert(r.falseNegatives == 0)
  }

  test("counts false negatives") {
    val n = 5
    val qs = Seq(q("a", Seq(0, 1, 2), n))
    val r = FprEval.evaluate(_ => BitVector.of(n, Seq(0)), qs, n)
    assert(r.falseNegatives == 2)
    assert(r.totalPositives == 3)
  }

  test("answer-everything gives fpRate close to 1 on negatives") {
    val n = 8
    val qs = Seq(q("a", Seq.empty, n), q("b", Seq.empty, n))
    val r = FprEval.evaluate(_ => BitVector.full(n), qs, n)
    assert(r.falsePositives == 16 && r.totalNegatives == 16)
    assert(r.fpRate == 1.0)
    assert(r.fpPercent == 100.0)
  }

  test("empty workload yields zero rates") {
    val r = FprEval.evaluate(_ => BitVector.empty(3), Seq.empty, 3)
    assert(r.fpRate == 0.0 && r.totalNegatives == 0)
  }

  test("aggregates across queries") {
    val n = 4
    val qs = Seq(q("a", Seq(0), n), q("b", Seq(1), n), q("c", Seq.empty, n))
    val r = FprEval.evaluate(k => BitVector.of(n, Seq(3)), qs, n)
    assert(r.falsePositives == 3)     // bit 3 wrong for each of 3 queries
    assert(r.falseNegatives == 2)     // missed bit 0 of a, bit 1 of b
    assert(r.totalNegatives == 3 + 3 + 4)
  }

  test("wrong answer width is rejected") {
    val qs = Seq(q("a", Seq(0), 4))
    intercept[IllegalArgumentException](
      FprEval.evaluate(_ => BitVector.empty(5), qs, 4))
  }
}
