package repro.util

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropSupport

class BloomFilterSpec extends AnyFunSuite with PropSupport {

  test("no false negatives on inserted keys") {
    val keys = (1L to 5000L).map(_ * 37)
    val f = BloomFilter.of(keys)
    keys.foreach(k => assert(f.mightContain(k), s"false negative for $k"))
  }

  test("false positive rate near the configured fpp") {
    val keys = (1L to 20000L)
    val f = BloomFilter.of(keys, fpp = 0.03)
    val probes = (1000001L to 1050000L)
    val fp = probes.count(f.mightContain)
    val rate = fp.toDouble / probes.size
    assert(rate < 0.06, s"fp rate too high: $rate")
  }

  test("empty filter contains nothing") {
    val f = BloomFilter.create(100)
    assert((1L to 1000L).forall(k => !f.mightContain(k)))
  }

  test("merge is a union: both sides' keys are contained") {
    val a = BloomFilter.create(1000)
    val b = BloomFilter.create(1000)
    (1L to 500L).foreach(a.add)
    (501L to 1000L).foreach(b.add)
    val m = a.merge(b)
    assert((1L to 1000L).forall(m.mightContain))
  }

  test("merge rejects mismatched sizing") {
    val a = BloomFilter.create(100)
    val b = BloomFilter.create(100000)
    assertThrows[IllegalArgumentException](a.merge(b))
  }

  test("sizing: more keys -> more bits") {
    assert(BloomFilter.create(100000).numBits > BloomFilter.create(100).numBits)
  }

  test("sizing: tighter fpp -> more bits") {
    assert(BloomFilter.create(1000, 0.001).numBits > BloomFilter.create(1000, 0.1).numBits)
  }

  test("create rejects invalid arguments") {
    assertThrows[IllegalArgumentException](BloomFilter.create(0))
    assertThrows[IllegalArgumentException](BloomFilter.create(10, 0.0))
    assertThrows[IllegalArgumentException](BloomFilter.create(10, 1.0))
  }

  test("saturation grows with insertions and stays in [0,1]") {
    val f = BloomFilter.create(1000)
    val s0 = f.saturation
    (1L to 1000L).foreach(f.add)
    val s1 = f.saturation
    assert(s0 == 0.0 && s1 > s0 && s1 <= 1.0)
  }

  test("property: inserted keys are always found (arbitrary key sets)") {
    checkProp(Prop.forAll(Gen.nonEmptyListOf(Gen.chooseNum(Long.MinValue, Long.MaxValue))) { keys =>
      val f = BloomFilter.of(keys)
      keys.forall(f.mightContain)
    })
  }

  test("property: merge is commutative on membership") {
    checkProp(Prop.forAll(
      Gen.listOf(Gen.chooseNum(-10000L, 10000L)),
      Gen.listOf(Gen.chooseNum(-10000L, 10000L))) { (ka, kb) =>
      val a = BloomFilter.create(1000); ka.foreach(a.add)
      val b = BloomFilter.create(1000); kb.foreach(b.add)
      val probes = -20000L to 20000L by 997
      probes.forall(p => a.merge(b).mightContain(p) == b.merge(a).mightContain(p))
    })
  }

  test("filter is serializable (needed to broadcast into semijoin reducers)") {
    val f = BloomFilter.of(1L to 100L)
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(f)
    val back = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[BloomFilter]
    assert((1L to 100L).forall(back.mightContain))
  }
}
