package repro.llap

import java.io.{DataInputStream, DataOutputStream}

import org.apache.spark.sql.types._

/** A decoded column chunk: one column of one row group (§5.1).
  *
  * This is the LLAP-internal columnar representation the I/O elevator
  * produces and executors consume. Integral types (int/long/date) share a
  * long backing array; only one backing array is populated per instance.
  * On disk chunks are stored either PLAIN or run-length encoded (RLE),
  * whichever is smaller — mirroring LLAP's internal RLE format.
  */
final class ColumnVec(
    val dataType: DataType,
    val n: Int,
    val nulls: Array[Boolean],
    val longs: Array[Long],
    val doubles: Array[Double],
    val strings: Array[String]) extends Serializable {

  def isNullAt(i: Int): Boolean = nulls(i)
  def getLong(i: Int): Long = longs(i)
  def getDouble(i: Int): Double = doubles(i)
  def getString(i: Int): String = strings(i)

  /** Approximate in-memory footprint, used for cache accounting. */
  def sizeBytes: Long = dataType match {
    case StringType => 16L * n + Option(strings).map(_.iterator.filter(_ != null).map(_.length.toLong * 2).sum).getOrElse(0L)
    case DoubleType => 9L * n
    case _          => 9L * n
  }
}

object ColumnVec {

  private val TagLong = 0; private val TagInt = 1; private val TagDouble = 2
  private val TagString = 3; private val TagDate = 4
  private val EncPlain = 0; private val EncRle = 1

  def tagOf(dt: DataType): Int = dt match {
    case LongType    => TagLong
    case IntegerType => TagInt
    case DoubleType  => TagDouble
    case StringType  => TagString
    case DateType    => TagDate
    case other       => throw new IllegalArgumentException(s"unsupported OrcLite type: $other")
  }

  def typeOf(tag: Int): DataType = tag match {
    case TagLong => LongType; case TagInt => IntegerType; case TagDouble => DoubleType
    case TagString => StringType; case TagDate => DateType
  }

  /** Builder collecting raw values for one chunk before encoding. */
  final class Builder(val dataType: DataType, capacity: Int) {
    private val nulls = new Array[Boolean](capacity)
    private val longs = if (isIntegral(dataType)) new Array[Long](capacity) else null
    private val doubles = if (dataType == DoubleType) new Array[Double](capacity) else null
    private val strings = if (dataType == StringType) new Array[String](capacity) else null
    private var n = 0

    def appendNull(): Unit = { nulls(n) = true; n += 1 }
    def appendLong(v: Long): Unit = { longs(n) = v; n += 1 }
    def appendDouble(v: Double): Unit = { doubles(n) = v; n += 1 }
    def appendString(v: String): Unit = { strings(n) = v; n += 1 }

    def result(): ColumnVec = new ColumnVec(
      dataType, n,
      java.util.Arrays.copyOf(nulls, n),
      if (longs != null) java.util.Arrays.copyOf(longs, n) else null,
      if (doubles != null) java.util.Arrays.copyOf(doubles, n) else null,
      if (strings != null) java.util.Arrays.copyOf(strings, n) else null,
    )
  }

  def isIntegral(dt: DataType): Boolean =
    dt == LongType || dt == IntegerType || dt == DateType

  // ------------------------------------------------------------- encoding

  /** Writes the chunk; picks RLE when the column has long runs. */
  def encode(vec: ColumnVec, out: DataOutputStream): Unit = {
    out.writeByte(tagOf(vec.dataType))
    out.writeInt(vec.n)
    // null mask packed as bits
    var i = 0
    var acc = 0
    while (i < vec.n) {
      if (vec.nulls(i)) acc |= 1 << (i & 7)
      if ((i & 7) == 7) { out.writeByte(acc); acc = 0 }
      i += 1
    }
    if ((vec.n & 7) != 0) out.writeByte(acc)
    vec.dataType match {
      case dt if isIntegral(dt) =>
        val runs = countRuns(vec.longs, vec.n)
        if (runs * 2 < vec.n) { out.writeByte(EncRle); writeRleLongs(vec, out) }
        else { out.writeByte(EncPlain); i = 0; while (i < vec.n) { out.writeLong(vec.longs(i)); i += 1 } }
      case DoubleType =>
        out.writeByte(EncPlain)
        i = 0; while (i < vec.n) { out.writeDouble(vec.doubles(i)); i += 1 }
      case StringType =>
        out.writeByte(EncPlain)
        i = 0
        while (i < vec.n) {
          if (!vec.nulls(i)) {
            val b = vec.strings(i).getBytes("UTF-8")
            out.writeInt(b.length); out.write(b)
          }
          i += 1
        }
      case other => throw new IllegalArgumentException(s"unsupported: $other")
    }
  }

  def decode(in: DataInputStream): ColumnVec = {
    val dt = typeOf(in.readByte().toInt)
    val n = in.readInt()
    val nulls = new Array[Boolean](n)
    var i = 0
    while (i < n) {
      val b = in.readByte().toInt
      var j = 0
      while (j < 8 && i + j < n) { nulls(i + j) = ((b >> j) & 1) == 1; j += 1 }
      i += 8
    }
    i = 0
    val enc = in.readByte().toInt
    dt match {
      case t if isIntegral(t) =>
        val longs = new Array[Long](n)
        if (enc == EncRle) readRleLongs(longs, n, in)
        else { i = 0; while (i < n) { longs(i) = in.readLong(); i += 1 } }
        new ColumnVec(t, n, nulls, longs, null, null)
      case DoubleType =>
        val ds = new Array[Double](n)
        i = 0; while (i < n) { ds(i) = in.readDouble(); i += 1 }
        new ColumnVec(dt, n, nulls, null, ds, null)
      case StringType =>
        val ss = new Array[String](n)
        i = 0
        while (i < n) {
          if (!nulls(i)) {
            val len = in.readInt(); val b = new Array[Byte](len)
            in.readFully(b); ss(i) = new String(b, "UTF-8")
          }
          i += 1
        }
        new ColumnVec(dt, n, nulls, null, null, ss)
      case other => throw new IllegalArgumentException(s"unsupported: $other")
    }
  }

  private def countRuns(xs: Array[Long], n: Int): Int = {
    if (n == 0) return 0
    var runs = 1; var i = 1
    while (i < n) { if (xs(i) != xs(i - 1)) runs += 1; i += 1 }
    runs
  }

  private def writeRleLongs(vec: ColumnVec, out: DataOutputStream): Unit = {
    var i = 0
    while (i < vec.n) {
      val v = vec.longs(i)
      var j = i + 1
      while (j < vec.n && vec.longs(j) == v) j += 1
      out.writeLong(v); out.writeInt(j - i)
      i = j
    }
  }

  private def readRleLongs(target: Array[Long], n: Int, in: DataInputStream): Unit = {
    var i = 0
    while (i < n) {
      val v = in.readLong(); val run = in.readInt()
      var j = 0
      while (j < run) { target(i + j) = v; j += 1 }
      i += run
    }
  }
}
