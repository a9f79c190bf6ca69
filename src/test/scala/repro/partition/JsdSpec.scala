package repro.partition

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class JsdSpec extends AnyFunSuite {

  private def randDist(rng: Random, n: Int): Array[Double] = {
    val raw = Array.fill(n)(rng.nextDouble() + 1e-3)
    val s = raw.sum
    raw.map(_ / s)
  }

  test("KLD of a distribution with itself is zero") {
    val rng = new Random(1)
    (1 to 20).foreach { _ =>
      val d = randDist(rng, 8)
      assert(math.abs(Jsd.kld(d, d)) < 1e-12)
    }
  }

  test("KLD is non-negative (Gibbs inequality)") {
    val rng = new Random(2)
    (1 to 100).foreach { _ =>
      assert(Jsd.kld(randDist(rng, 8), randDist(rng, 8)) >= -1e-12)
    }
  }

  test("KLD is asymmetric in general") {
    val a = Array(0.9, 0.1)
    val b = Array(0.1, 0.9)
    assert(math.abs(Jsd.kld(a, b) - Jsd.kld(b, a)) < 1e-12) // symmetric counter-case
    val c = Array(0.8, 0.2)
    assert(Jsd.kld(a, c) != Jsd.kld(c, a))
  }

  test("JSD is symmetric") {
    val rng = new Random(3)
    (1 to 100).foreach { _ =>
      val a = randDist(rng, 8); val b = randDist(rng, 8)
      assert(math.abs(Jsd.jsd(a, b) - Jsd.jsd(b, a)) < 1e-12)
    }
  }

  test("JSD is zero iff the distributions coincide") {
    val a = Array(0.25, 0.25, 0.5)
    assert(Jsd.jsd(a, a) == 0.0)
    assert(Jsd.jsd(a, Array(0.5, 0.25, 0.25)) > 0.0)
  }

  test("more similar distributions have smaller JSD") {
    val a = Array(0.7, 0.2, 0.1)
    val near = Array(0.65, 0.25, 0.1)
    val far = Array(0.1, 0.2, 0.7)
    assert(Jsd.jsd(a, near) < Jsd.jsd(a, far))
  }

  test("length mismatch rejected") {
    intercept[IllegalArgumentException] { Jsd.kld(Array(1.0), Array(0.5, 0.5)) }
  }
}
