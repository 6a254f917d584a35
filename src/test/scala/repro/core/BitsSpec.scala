package repro.core

import org.scalatest.funsuite.AnyFunSuite

class BitsSpec extends AnyFunSuite {

  test("alloc sizes") {
    assert(Bits.alloc(0).length == 0)
    assert(Bits.alloc(1).length == 1)
    assert(Bits.alloc(64).length == 1)
    assert(Bits.alloc(65).length == 2)
    assert(Bits.alloc(128).length == 2)
    assert(Bits.alloc(129).length == 3)
  }

  for (n <- Seq(1, 5, 63, 64, 65, 100, 128, 200)) {
    test(s"full($n) sets exactly $n bits") {
      val b = Bits.full(n)
      assert(Bits.count(b) == n)
      assert((0 until n).forall(Bits.get(b, _)))
    }
  }

  test("set/get roundtrip") {
    val b = Bits.alloc(200)
    val idx = Seq(0, 1, 63, 64, 65, 127, 128, 199)
    idx.foreach(Bits.set(b, _))
    assert(Bits.count(b) == idx.size)
    idx.foreach(i => assert(Bits.get(b, i)))
    assert(!Bits.get(b, 2) && !Bits.get(b, 100))
  }

  for (seed <- 0 until 10) {
    test(s"and/andNot/countAnd agree with set semantics (seed=$seed)") {
      val rng = new java.util.Random(seed)
      val xs = Seq.fill(rng.nextInt(100))(rng.nextInt(256))
      val ys = Seq.fill(rng.nextInt(100))(rng.nextInt(256))
      val a = Bits.alloc(256); xs.foreach(Bits.set(a, _))
      val b = Bits.alloc(256); ys.foreach(Bits.set(b, _))
      val sa = xs.toSet; val sb = ys.toSet
      assert(Bits.toIndices(Bits.and(a, b)).toSet == (sa & sb))
      assert(Bits.toIndices(Bits.andNot(a, b)).toSet == (sa -- sb))
      assert(Bits.countAnd(a, b) == (sa & sb).size)
    }
  }

  test("foreach visits set bits in ascending order") {
    val b = Bits.alloc(300)
    val idx = Seq(3, 64, 65, 150, 299)
    idx.foreach(Bits.set(b, _))
    val seen = scala.collection.mutable.ArrayBuffer[Int]()
    Bits.foreach(b)(seen += _)
    assert(seen.toSeq == idx)
  }

  test("toIndices of empty mask") {
    assert(Bits.toIndices(Bits.alloc(100)).isEmpty)
  }
}
