package repro.core

import org.scalatest.funsuite.AnyFunSuite

class GraySpec extends AnyFunSuite {

  test("encode/decode roundtrip over [0, 4096)") {
    (0L until 4096L).foreach(n => assert(Gray.decode(Gray.encode(n)) == n))
  }

  test("consecutive codewords differ in exactly one bit") {
    (0L until 4095L).foreach { n =>
      val diff = Gray.encode(n) ^ Gray.encode(n + 1)
      assert(java.lang.Long.bitCount(diff) == 1, s"at n=$n")
    }
  }

  test("rank is the inverse enumeration position") {
    (0L until 1024L).foreach(n => assert(Gray.rank(Gray.encode(n)) == n))
  }

  test("encode is a bijection on [0, 1024)") {
    val codes = (0L until 1024L).map(Gray.encode)
    assert(codes.distinct.length == 1024)
    assert(codes.forall(c => c >= 0 && c < 1024))
  }

  for (bits <- Seq(3, 4, 8, 12)) {
    test(s"sorting $bits-bit words by Gray rank yields a 1-bit-step sequence") {
      val words = (0L until (1L << bits)).toArray
      val ordered = words.sortBy(Gray.rank)
      ordered.sliding(2).foreach { pair =>
        assert(java.lang.Long.bitCount(pair(0) ^ pair(1)) == 1)
      }
    }
  }

  test("encode(0) == 0 and rank(0) == 0") {
    assert(Gray.encode(0) == 0)
    assert(Gray.rank(0) == 0)
  }
}
