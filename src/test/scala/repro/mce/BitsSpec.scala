package repro.mce

import repro.SparkSpec
import scala.util.Random

class BitsSpec extends SparkSpec {

  test("set/get/clear") {
    val a = Bits.make(130)
    assert(!Bits.get(a, 0) && !Bits.get(a, 129))
    Bits.set(a, 0); Bits.set(a, 63); Bits.set(a, 64); Bits.set(a, 129)
    assert(Bits.get(a, 0) && Bits.get(a, 63) && Bits.get(a, 64) && Bits.get(a, 129))
    Bits.clear(a, 64)
    assert(!Bits.get(a, 64))
    assert(Bits.count(a) == 3)
  }

  test("empty and count") {
    val a = Bits.make(100)
    assert(Bits.isEmpty(a) && Bits.count(a) == 0)
    Bits.set(a, 99)
    assert(!Bits.isEmpty(a) && Bits.count(a) == 1)
  }

  test("first bit") {
    val a = Bits.make(200)
    assert(Bits.first(a) == -1)
    Bits.set(a, 150); Bits.set(a, 77)
    assert(Bits.first(a) == 77)
  }

  test("foreachBit iterates ascending") {
    val a = Bits.make(300)
    val want = Seq(3, 64, 65, 128, 299)
    want.foreach(Bits.set(a, _))
    val got = scala.collection.mutable.ArrayBuffer[Int]()
    Bits.foreachBit(a)(got += _)
    assert(got.toSeq == want)
    assert(Bits.toArray(a).toSeq == want)
  }

  for (seed <- 0 until 10)
    test(s"boolean algebra against reference sets, seed=$seed") {
      val rng = new Random(seed)
      val n = 1 + rng.nextInt(250)
      val sa = (0 until n).filter(_ => rng.nextBoolean()).toSet
      val sb = (0 until n).filter(_ => rng.nextBoolean()).toSet
      val a = Bits.make(n); sa.foreach(Bits.set(a, _))
      val b = Bits.make(n); sb.foreach(Bits.set(b, _))
      assert(Bits.toArray(Bits.and(a, b)).toSet == sa.intersect(sb))
      assert(Bits.toArray(Bits.andNot(a, b)).toSet == sa.diff(sb))
      assert(Bits.countAnd(a, b) == sa.intersect(sb).size)
      val or = Bits.make(n); Bits.orInto(or, a, b)
      assert(Bits.toArray(or).toSet == sa.union(sb))
      assert(Bits.subsetOf(a, or) && Bits.subsetOf(b, or))
      assert(Bits.subsetOf(a, b) == sa.subsetOf(sb))
    }

  test("mixXInto computes (x∩full) ∪ (c∩full∖surv)") {
    val rng = new Random(42)
    val n = 180
    def randomSet() = (0 until n).filter(_ => rng.nextBoolean()).toSet
    val sx = randomSet(); val sc = randomSet()
    val sfull = randomSet(); val ssurv = randomSet().intersect(sfull)
    def bits(s: Set[Int]) = { val a = Bits.make(n); s.foreach(Bits.set(a, _)); a }
    val dest = Bits.make(n)
    Bits.mixXInto(dest, bits(sx), bits(sc), bits(sfull), bits(ssurv))
    val expect = sx.intersect(sfull).union(sc.intersect(sfull).diff(ssurv))
    assert(Bits.toArray(dest).toSet == expect)
  }

  test("copy is independent") {
    val a = Bits.make(70); Bits.set(a, 5)
    val b = Bits.copy(a)
    Bits.set(b, 6)
    assert(!Bits.get(a, 6) && Bits.get(b, 5))
  }
}
