package repro.util

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropSupport

class HyperLogLogSpec extends AnyFunSuite with PropSupport {

  private def relErr(est: Long, actual: Long): Double =
    math.abs(est - actual).toDouble / math.max(actual, 1L)

  test("empty sketch estimates zero") {
    assert(HyperLogLog().estimate == 0L)
  }

  test("small cardinalities are near-exact (linear counting range)") {
    for (n <- Seq(1, 10, 100, 500)) {
      val h = HyperLogLog.of((1L to n.toLong).map(_ * 7919))
      assert(relErr(h.estimate, n) < 0.05, s"n=$n est=${h.estimate}")
    }
  }

  test("large cardinalities within ~7% at p=12 (std error 1.6%, ~4 sigma)") {
    for (n <- Seq(10000L, 100000L, 1000000L)) {
      val h = HyperLogLog.of((1L to n).map(_ * 2654435761L))
      assert(relErr(h.estimate, n) < 0.07, s"n=$n est=${h.estimate}")
    }
  }

  test("duplicates do not inflate the estimate") {
    val h = HyperLogLog()
    (1L to 1000L).foreach(k => (1 to 10).foreach(_ => h.add(k)))
    assert(relErr(h.estimate, 1000L) < 0.05)
  }

  test("merge equals sketching the union (lossless combination)") {
    val a = HyperLogLog.of((1L to 50000L))
    val b = HyperLogLog.of((25001L to 75000L))
    val u = HyperLogLog.of((1L to 75000L))
    assert(a.merge(b).estimate == u.estimate)
  }

  test("merge is commutative and associative on estimates") {
    val a = HyperLogLog.of((1L to 1000L))
    val b = HyperLogLog.of((500L to 2000L))
    val c = HyperLogLog.of((1500L to 3000L))
    assert(a.merge(b).estimate == b.merge(a).estimate)
    assert(a.merge(b).merge(c).estimate == a.merge(b.merge(c)).estimate)
  }

  test("merge rejects different precisions") {
    assertThrows[IllegalArgumentException](HyperLogLog(10).merge(HyperLogLog(12)))
  }

  test("precision bounds enforced") {
    assertThrows[IllegalArgumentException](HyperLogLog(3))
    assertThrows[IllegalArgumentException](HyperLogLog(19))
  }

  test("string values are supported") {
    val h = HyperLogLog()
    (1 to 2000).foreach(i => h.add(s"value_$i"))
    assert(relErr(h.estimate, 2000) < 0.08)
  }

  test("higher precision tightens the estimate") {
    val n = 200000L
    val errLo = relErr(HyperLogLog.of((1L to n), p = 8).estimate, n)
    val errHi = relErr(HyperLogLog.of((1L to n), p = 14).estimate, n)
    assert(errHi <= errLo + 0.01, s"p=8 err=$errLo p=14 err=$errHi")
  }

  test("property: merge(a,b) >= max of individual estimates (monotone union)") {
    checkProp(Prop.forAll(
      Gen.listOf(Gen.chooseNum(1L, 100000L)),
      Gen.listOf(Gen.chooseNum(1L, 100000L))) { (xs, ys) =>
      val a = HyperLogLog.of(xs); val b = HyperLogLog.of(ys)
      val m = a.merge(b).estimate
      m >= a.estimate && m >= b.estimate
    }, minTests = 30)
  }

  test("sketch is serializable (stats are shipped from executors)") {
    val h = HyperLogLog.of(1L to 1000L)
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(h)
    val back = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[HyperLogLog]
    assert(back.estimate == h.estimate)
  }
}
