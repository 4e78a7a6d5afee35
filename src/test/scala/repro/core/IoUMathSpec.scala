package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalactic.Tolerance._
import org.scalacheck.Gen

import repro.GenChecks
import IoUMath._

class IoUMathSpec extends AnyFunSuite with GenChecks {

  private val genHist: Gen[Seq[HistRow]] = Gen.nonEmptyListOf(for {
    wi <- Gen.choose(1, 200)
    count <- Gen.choose(1L, 1000L)
    ci <- Gen.choose(0.1, 1.0)
  } yield HistRow(wi, count, ci)).map(_.toSeq)

  test("q is a probability for all (L, B, wi)") {
    forAllG(for {
      b <- Gen.choose(10, 100000)
      l <- Gen.choose(1, 16).suchThat(_ <= b)
      wi <- Gen.choose(0, 500)
    } yield (b, l, wi), trials = 200) { case (b, l, wi) =>
      val q = qExact(l, b.toDouble, wi)
      assert(q >= 0.0 && q <= 1.0)
      val qh = qHat(l.toDouble, b.toDouble, wi)
      assert(qh >= 0.0 && qh <= 1.0)
    }
  }

  test("q with zero distinct words is zero (no collisions possible)") {
    assert(qExact(3, 1000, 0) == 0.0)
    assert(qHat(3.0, 1000, 0) == 0.0)
  }

  test("hash-table case L=1: q1 = 1-(1-1/B)^wi") {
    val b = 1000.0; val wi = 50
    assert(qExact(1, b, wi) === (1.0 - math.pow(1.0 - 1.0 / b, wi)) +- 1e-12)
  }

  test("exact q exceeds the approximation (F > F-hat, the paper's remark)") {
    forAllG(for {
      b <- Gen.choose(100, 10000)
      l <- Gen.choose(1, 8)
      wi <- Gen.choose(1, 100)
    } yield (b, l, wi), trials = 200) { case (b, l, wi) =>
      assert(qExact(l, b.toDouble, wi) >= qHat(l.toDouble, b.toDouble, wi) - 1e-12)
    }
  }

  test("more bins (larger B) never hurts accuracy at fixed L") {
    forAllG(Gen.choose(1, 6), trials = 30) { l =>
      val q1 = qExact(l, 1000.0, 40)
      val q2 = qExact(l, 4000.0, 40)
      assert(q2 <= q1)
    }
  }

  test("F is the c-weighted sum of per-document q") {
    val hist = Seq(HistRow(10, 100, 0.9), HistRow(20, 50, 0.8))
    val b = 500.0
    val want = 100 * 0.9 * qExact(2, b, 10) + 50 * 0.8 * qExact(2, b, 20)
    assert(fExact(2, b, hist) === want +- 1e-9)
  }

  test("Lemma 1: L_i* = (B/wi) ln 2 minimises q-hat over continuous L") {
    forAllG(for {
      b <- Gen.choose(500, 5000)
      wi <- Gen.choose(5, 60)
    } yield (b, wi), trials = 50) { case (b, wi) =>
      val lStar = liStar(b.toDouble, wi)
      if (lStar >= 1.0 && lStar <= b) {
        val qStar = qHat(lStar, b.toDouble, wi)
        // q-hat at the minimiser equals 2^{-L_i*}
        assert(qStar === math.pow(2.0, -lStar) +- 1e-9)
        // and nearby points are no better
        Seq(0.8, 0.9, 1.1, 1.25).foreach { f =>
          val l2 = lStar * f
          if (l2 >= 1.0 && l2 <= b) assert(qHat(l2, b.toDouble, wi) >= qStar - 1e-12)
        }
      }
    }
  }

  test("Lemma 1: lower bound really bounds F-hat and F") {
    forAllG(Gen.zip(genHist, Gen.choose(200, 20000)), trials = 100) { case (hist, b) =>
      val lb = lowerBound(b.toDouble, hist)
      (1 to math.min(b, 32)).foreach { l =>
        assert(fHat(l.toDouble, b.toDouble, hist) >= lb - 1e-9)
        assert(fExact(l, b.toDouble, hist) >= lb - 1e-9)
      }
    }
  }

  test("Lemma 2: F-hat strictly decreasing below L_min and bounded by n 2^-L") {
    forAllG(genHist, trials = 60) { hist =>
      val b = 50000
      val lmin = lMin(b.toDouble, hist)
      val n = hist.map(_.count).sum.toDouble
      var l = 1.0
      var prev = Double.MaxValue
      while (l < math.min(lmin, 24.0)) {
        val f = fHat(l, b.toDouble, hist)
        assert(f < prev + 1e-12, s"not decreasing at L=$l")
        assert(f <= n * math.pow(2.0, -l) + 1e-9)
        prev = f; l += 1.0
      }
    }
  }

  test("Lemma 3: F-hat strictly increasing above L_max") {
    val hist = Seq(HistRow(40, 100, 1.0), HistRow(60, 100, 1.0))
    val b = 200
    val lmax = lMax(b.toDouble, hist) // = 200*ln2/40 ≈ 3.47
    var l = math.ceil(lmax) + 1
    var prev = fHat(l, b.toDouble, hist)
    while (l < 20) {
      l += 1
      val f = fHat(l, b.toDouble, hist)
      assert(f > prev - 1e-12, s"not increasing at L=$l")
      prev = f
    }
  }

  test("L_min <= L_max always") {
    forAllG(Gen.zip(genHist, Gen.choose(100, 100000)), trials = 100) { case (hist, b) =>
      assert(lMin(b.toDouble, hist) <= lMax(b.toDouble, hist) + 1e-12)
    }
  }

  test("Hoeffding deviation matches Eq. 5 closed form") {
    assert(hoeffdingEps(1.0, 0.05) === math.sqrt(0.5 * math.log(20.0)) +- 1e-12)
    // larger sigma or smaller delta widen the bound
    assert(hoeffdingEps(2.0, 0.05) > hoeffdingEps(1.0, 0.05))
    assert(hoeffdingEps(1.0, 0.01) > hoeffdingEps(1.0, 0.05))
    intercept[IllegalArgumentException](hoeffdingEps(1.0, 0.0))
  }

  test("top-K sample size reproduces the paper's ~23 samples for top-10") {
    // §V-A0c: "the conservative setting which selects about 23 samples to
    // answer top-10 query" at delta = 1e-6, F0 = 1.
    val rk = topKSampleSize(k = 10, r = 1000, f0 = 1.0, delta = 1e-6)
    assert(rk >= 21 && rk <= 25, s"R_K = $rk")
  }

  test("top-K: K >= R - F0 forces fetching everything") {
    assert(topKSampleSize(10, 10, 1.0, 1e-6) == 10)
    assert(topKSampleSize(10, 11, 1.0, 1e-6) == 11)
    assert(topKSampleSize(5, 0, 1.0, 1e-6) == 0)
  }

  test("top-K sample size is monotone in K and never exceeds R") {
    forAllG(for {
      r <- Gen.choose(30, 5000)
      k <- Gen.choose(1, 20)
      f0 <- Gen.choose(0.0, 5.0)
    } yield (r, k, f0), trials = 200) { case (r, k, f0) =>
      val rk = topKSampleSize(k, r, f0, 1e-6)
      val rk2 = topKSampleSize(k + 1, r, f0, 1e-6)
      assert(rk >= k)
      assert(rk <= r)
      assert(rk2 >= rk)
    }
  }

  test("top-K sample is large enough in expectation") {
    // E[relevant in sample] = p * R_K must comfortably exceed K.
    forAllG(for {
      r <- Gen.choose(100, 5000)
      k <- Gen.choose(1, 20)
    } yield (r, k), trials = 100) { case (r, k) =>
      val f0 = 1.0
      val rk = topKSampleSize(k, r, f0, 1e-6)
      val p = 1.0 - f0 / r
      if (rk < r) assert(p * rk >= k)
    }
  }

  test("HistRow validates its fields") {
    intercept[IllegalArgumentException](HistRow(-1, 1, 0.5))
    intercept[IllegalArgumentException](HistRow(1, 1, 1.5))
  }
}
