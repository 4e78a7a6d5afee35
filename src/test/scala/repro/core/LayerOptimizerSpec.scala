package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import repro.GenChecks
import IoUMath.HistRow
import LayerOptimizer._

class LayerOptimizerSpec extends AnyFunSuite with GenChecks {

  private val genHist: Gen[Seq[HistRow]] = Gen.nonEmptyListOf(for {
    wi <- Gen.choose(2, 80)
    count <- Gen.choose(1L, 2000L)
    ci <- Gen.choose(0.5, 1.0)
  } yield HistRow(wi, count, ci)).map(_.toSeq)

  test("returned L satisfies the F0 constraint") {
    forAllG(Gen.zip(genHist, Gen.choose(2000, 50000), Gen.oneOf(0.1, 1.0, 10.0)),
            trials = 150) { case (hist, b, f0) =>
      minimizeLayers(b, f0, hist) match {
        case Right(l) =>
          assert(l >= 1 && l <= b)
          assert(IoUMath.fExact(l, b.toDouble, hist) <= f0)
        case Left(_) => // rejection legality checked separately
      }
    }
  }

  test("returned L is MINIMAL (matches brute force) in the fast region") {
    forAllG(Gen.zip(genHist, Gen.oneOf(0.01, 0.1, 1.0, 5.0)), trials = 150) {
      case (hist, f0) =>
        val b = 50000 // large enough that L* sits in the decreasing region
        (minimizeLayers(b, f0, hist), bruteForce(b, f0, hist, maxL = 64)) match {
          case (Right(l), Some(bf)) => assert(l == bf, s"optimizer $l vs brute force $bf")
          case (Right(l), None)     => fail(s"optimizer found $l, brute force (<=64) none")
          case (Left(_), Some(bf))  => fail(s"optimizer rejected but L=$bf works")
          case (Left(_), None)      => succeed
        }
    }
  }

  test("a sketch with enough bins always accepts F0 = 1") {
    // Remark to Lemma 2: B >= (1/ln2) * max wi * log2(n/F0) guarantees the
    // fast region covers the constraint.
    forAllG(genHist, trials = 60) { hist =>
      val maxWi = hist.map(_.wi).max
      val n = hist.map(_.count).sum.toDouble
      val b = math.ceil(maxWi / math.log(2.0) * (math.log(n) / math.log(2.0) + 4)).toInt + 8
      assert(minimizeLayers(b, 1.0, hist).isRight, s"rejected at B=$b")
    }
  }

  test("infeasible budgets are rejected via the Lemma-1 lower bound") {
    // Tiny B, huge wi: even the best L cannot push F below ~n.
    val hist = Seq(HistRow(50, 1000L, 1.0))
    minimizeLayers(60, 1e-6, hist) match {
      case Left(r) => assert(r == InfeasibleLowerBound || r == SearchExhausted)
      case Right(l) => fail(s"accepted L=$l for an infeasible budget")
    }
  }

  test("rejection never happens when some L <= B satisfies the budget") {
    forAllG(Gen.zip(genHist, Gen.choose(500, 5000)), trials = 100) { case (hist, b) =>
      minimizeLayers(b, 1.0, hist) match {
        case Left(_) =>
          // verify rejection honesty: no L in [1, min(B, 64)] works
          assert(bruteForce(b, 1.0, hist, maxL = 64).isEmpty)
        case Right(_) => succeed
      }
    }
  }

  test("optimal L decreases as F0 loosens") {
    forAllG(genHist, trials = 60) { hist =>
      val b = 50000
      val tight = minimizeLayers(b, 0.01, hist)
      val loose = minimizeLayers(b, 10.0, hist)
      (tight, loose) match {
        case (Right(lt), Right(ll)) => assert(ll <= lt)
        case (Left(_), Right(_))    => succeed // tighter budget may reject
        case (Left(_), Left(_))     => succeed
        case (Right(_), Left(_))    => fail("looser budget rejected but tighter accepted")
      }
    }
  }

  test("paper setting: HDFS-like shape picks L* = 2 at scaled B, F0 = 1") {
    // n = 30000 docs with ~13 distinct words each, B = 5000 (scaled 1e5).
    val hist = Seq(HistRow(13, 30000L, 0.99))
    assert(minimizeLayers(4950, 1.0, hist) == Right(2))
  }

  test("hash table degenerate: loose budget picks L* = 1") {
    val hist = Seq(HistRow(5, 100L, 1.0))
    assert(minimizeLayers(5000, 100.0, hist) == Right(1))
  }

  test("rejection messages are informative") {
    assert(InfeasibleLowerBound.message.nonEmpty)
    assert(SearchExhausted.message.nonEmpty)
  }
}
