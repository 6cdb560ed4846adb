package repro.llap

import java.io.File
import java.nio.file.Files

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import org.scalatest.funsuite.AnyFunSuite

class OrcLiteSpec extends AnyFunSuite {

  private val schema = StructType(Seq(
    StructField("k", LongType), StructField("v", DoubleType), StructField("s", StringType)))

  private def tmpFile(name: String): File =
    new File(Files.createTempDirectory("orclite").toFile, name)

  private def rows(n: Int): Iterator[Row] =
    (1 to n).iterator.map(i => Row(i.toLong, i * 1.5, s"s$i"))

  test("write/readMeta round trip: schema, row groups, counts") {
    val f = tmpFile("t1.orclite")
    val groups = OrcLite.write(f, schema, rows(25000), rowGroupSize = 8192)
    assert(groups == 4) // 8192*3 + 432
    val meta = OrcLite.readMeta(f)
    assert(meta.schema == schema)
    assert(meta.rowGroups == 4 && meta.totalRows == 25000)
    assert(meta.rowsInGroup(3) == 25000 - 3 * 8192)
  }

  test("chunk reads return the written data") {
    val f = tmpFile("t2.orclite")
    OrcLite.write(f, schema, rows(10000), rowGroupSize = 4096)
    val meta = OrcLite.readMeta(f)
    val k0 = OrcLite.readChunk(meta, 0, 0)
    assert(k0.getLong(0) == 1L && k0.getLong(4095) == 4096L)
    val v1 = OrcLite.readChunk(meta, 1, 1)
    assert(v1.getDouble(0) == 4097 * 1.5)
    val s2 = OrcLite.readChunk(meta, 2, 2)
    assert(s2.getString(0) == s"s${2 * 4096 + 1}")
  }

  test("per-row-group min/max index is correct") {
    val f = tmpFile("t3.orclite")
    OrcLite.write(f, schema, rows(10000), rowGroupSize = 5000)
    val meta = OrcLite.readMeta(f)
    assert(meta.index(0)(0).min.contains(1.0) && meta.index(0)(0).max.contains(5000.0))
    assert(meta.index(1)(0).min.contains(5001.0) && meta.index(1)(0).max.contains(10000.0))
  }

  test("Bloom index exists for integral columns and finds its values") {
    val f = tmpFile("t4.orclite")
    OrcLite.write(f, schema, rows(1000), rowGroupSize = 1000)
    val meta = OrcLite.readMeta(f)
    val bloom = meta.index(0)(0).bloom
    assert(bloom.isDefined, "no Bloom index on the long column")
    assert((1L to 1000L).forall(bloom.get.mightContain))
    assert(meta.index(0)(1).bloom.isEmpty, "doubles should not carry Bloom indexes")
  }

  test("nulls round trip through files") {
    val f = tmpFile("t5.orclite")
    val data = (1 to 100).map(i => Row(if (i % 3 == 0) null else i.toLong, i * 1.0, null))
    OrcLite.write(f, schema, data.iterator, rowGroupSize = 50)
    val meta = OrcLite.readMeta(f)
    val k = OrcLite.readChunk(meta, 0, 0)
    assert(k.isNullAt(2) && !k.isNullAt(0))
    val s = OrcLite.readChunk(meta, 0, 2)
    assert((0 until 50).forall(s.isNullAt))
  }

  test("date columns are stored as epoch days with stats") {
    val ds = StructType(Seq(StructField("d", DateType)))
    val f = tmpFile("t6.orclite")
    val data = (0 until 10).map(i => Row(java.sql.Date.valueOf(f"2020-01-${i + 1}%02d")))
    OrcLite.write(f, ds, data.iterator)
    val meta = OrcLite.readMeta(f)
    val d = OrcLite.readChunk(meta, 0, 0)
    val day0 = java.time.LocalDate.of(2020, 1, 1).toEpochDay
    assert(d.getLong(0) == day0 && d.getLong(9) == day0 + 9)
    assert(meta.index(0)(0).min.contains(day0.toDouble))
  }

  test("fileKey changes when the file is rewritten") {
    val f = tmpFile("t7.orclite")
    OrcLite.write(f, schema, rows(10))
    val k1 = OrcLite.fileKey(f)
    Thread.sleep(5)
    OrcLite.write(f, schema, rows(20))
    assert(OrcLite.fileKey(f) != k1, "identity must change on rewrite (cache validity)")
  }

  test("corrupt files are rejected") {
    val f = tmpFile("t8.orclite")
    Files.write(f.toPath, Array.fill[Byte](64)(7))
    assertThrows[Exception](OrcLite.readMeta(f))
  }
}
