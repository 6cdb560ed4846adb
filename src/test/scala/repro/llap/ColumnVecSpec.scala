package repro.llap

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, DataInputStream, DataOutputStream}

import org.apache.spark.sql.types._
import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropSupport

class ColumnVecSpec extends AnyFunSuite with PropSupport {

  private def roundTrip(vec: ColumnVec): ColumnVec = {
    val bos = new ByteArrayOutputStream()
    ColumnVec.encode(vec, new DataOutputStream(bos))
    ColumnVec.decode(new DataInputStream(new ByteArrayInputStream(bos.toByteArray)))
  }

  private def longVec(xs: Seq[Option[Long]], dt: DataType = LongType): ColumnVec = {
    val b = new ColumnVec.Builder(dt, xs.size)
    xs.foreach { case Some(v) => b.appendLong(v); case None => b.appendNull() }
    b.result()
  }

  test("long round trip with nulls") {
    val xs = Seq(Some(1L), None, Some(-5L), Some(Long.MaxValue), None)
    val back = roundTrip(longVec(xs))
    assert(back.n == 5)
    assert(xs.indices.forall(i => back.isNullAt(i) == xs(i).isEmpty))
    assert(xs.indices.filter(xs(_).isDefined).forall(i => back.getLong(i) == xs(i).get))
  }

  test("double round trip") {
    val b = new ColumnVec.Builder(DoubleType, 4)
    Seq(1.5, -2.25, 0.0, 1e300).foreach(b.appendDouble)
    val back = roundTrip(b.result())
    assert((0 until 4).map(back.getDouble) == Seq(1.5, -2.25, 0.0, 1e300))
  }

  test("string round trip with nulls and unicode") {
    val b = new ColumnVec.Builder(StringType, 4)
    b.appendString("hello"); b.appendNull(); b.appendString(""); b.appendString("héllo∅")
    val back = roundTrip(b.result())
    assert(back.getString(0) == "hello" && back.isNullAt(1))
    assert(back.getString(2) == "" && back.getString(3) == "héllo∅")
  }

  test("RLE is chosen for runs and encodes smaller than plain") {
    val runs = longVec((1 to 10).flatMap(v => Seq.fill(1000)(Some(v.toLong))))
    val distinct = longVec((1L to 10000L).map(Some(_)))
    def encodedSize(v: ColumnVec): Int = {
      val bos = new ByteArrayOutputStream()
      ColumnVec.encode(v, new DataOutputStream(bos)); bos.size()
    }
    assert(encodedSize(runs) < encodedSize(distinct) / 10,
      "run-heavy column should RLE-compress an order of magnitude better")
    val back = roundTrip(runs)
    assert((0 until 10000).forall(i => back.getLong(i) == (i / 1000) + 1))
  }

  test("integer and date types share the integral path") {
    assert(ColumnVec.isIntegral(IntegerType) && ColumnVec.isIntegral(DateType) &&
      ColumnVec.isIntegral(LongType) && !ColumnVec.isIntegral(DoubleType))
    val back = roundTrip(longVec(Seq(Some(42L)), IntegerType))
    assert(back.dataType == IntegerType && back.getLong(0) == 42L)
  }

  test("unsupported types are rejected") {
    assertThrows[IllegalArgumentException](ColumnVec.tagOf(BooleanType))
  }

  test("property: arbitrary long columns round trip exactly") {
    checkProp(Prop.forAll(Gen.listOf(Gen.option(Gen.chooseNum(Long.MinValue, Long.MaxValue)))) { xs =>
      val back = roundTrip(longVec(xs))
      back.n == xs.size && xs.indices.forall { i =>
        back.isNullAt(i) == xs(i).isEmpty && (xs(i).isEmpty || back.getLong(i) == xs(i).get)
      }
    })
  }

  test("sizeBytes is positive and grows with row count") {
    val small = longVec((1L to 10L).map(Some(_)))
    val large = longVec((1L to 1000L).map(Some(_)))
    assert(small.sizeBytes > 0 && large.sizeBytes > small.sizeBytes)
  }
}
