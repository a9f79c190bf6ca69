package repro.core

import org.scalatest.funsuite.AnyFunSuite

class VerifySpec extends AnyFunSuite {

  test("absThreshold: smallest count whose fraction reaches T") {
    assert(Verify.absThreshold(0.5, 10) == 5)
    assert(Verify.absThreshold(0.51, 10) == 6)
    assert(Verify.absThreshold(0.2, 10) == 2)
    assert(Verify.absThreshold(0.6, 5) == 3)
  }

  test("absThreshold is at least 1") {
    assert(Verify.absThreshold(0.0, 10) == 1)
    assert(Verify.absThreshold(0.01, 5) == 1)
  }

  test("absThreshold handles exact boundaries without float drift") {
    // 0.6 * 5 = 3.0000000000000004 in IEEE — must still be 3
    assert(Verify.absThreshold(0.6, 5) == 3)
    assert(Verify.absThreshold(0.3, 10) == 3)
    assert(Verify.absThreshold(1.0, 7) == 7)
  }

  test("absThreshold: T=100% requires every query vector") {
    (1 to 20).foreach(n => assert(Verify.absThreshold(1.0, n) == n))
  }
}
