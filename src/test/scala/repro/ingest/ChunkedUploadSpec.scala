package repro.ingest

import java.nio.charset.StandardCharsets
import java.nio.file.{Files, Paths}
import scala.jdk.CollectionConverters._

import org.scalatest.funsuite.AnyFunSuite

class ChunkedUploadSpec extends AnyFunSuite {

  private def tmp(): String = Files.createTempDirectory("chunk-spec").toString

  private def writeCsv(dir: String, nRows: Int): String = {
    val p = Paths.get(dir, "data.csv")
    val lines = "id,attribute,time,data" +: (0 until nRows).map(i => s"s$i,temp,2020-01-01,$i")
    Files.write(p, lines.mkString("\n").getBytes(StandardCharsets.UTF_8))
    p.toString
  }

  private def readLines(p: String): Vector[String] =
    Files.readAllLines(Paths.get(p), StandardCharsets.UTF_8).asScala.toVector

  test("10,000-line default chunking splits a 25k-row file into 3 chunks") {
    val dir = tmp()
    val csv = writeCsv(dir, 25000)
    val chunks = ChunkedUpload.split(csv, s"$dir/chunks")
    assert(chunks.length == 3)
    assert(readLines(chunks(0)).length == 10001) // header + 10000
    assert(readLines(chunks(1)).length == 10000)
    assert(readLines(chunks(2)).length == 5000)
  }

  test("header only on the first chunk") {
    val dir = tmp()
    val csv = writeCsv(dir, 7)
    val chunks = ChunkedUpload.split(csv, s"$dir/chunks", chunkLines = 3)
    assert(chunks.length == 3)
    assert(readLines(chunks(0)).head == "id,attribute,time,data")
    assert(!readLines(chunks(1)).head.startsWith("id,attribute"))
  }

  test("split + reassemble is the identity") {
    val dir = tmp()
    val csv = writeCsv(dir, 1234)
    val chunks = ChunkedUpload.split(csv, s"$dir/chunks", chunkLines = 100)
    val out = ChunkedUpload.reassemble(chunks, s"$dir/reassembled.csv")
    assert(readLines(out) == readLines(csv))
  }

  test("a file smaller than one chunk yields a single chunk") {
    val dir = tmp()
    val csv = writeCsv(dir, 5)
    val chunks = ChunkedUpload.split(csv, s"$dir/chunks")
    assert(chunks.length == 1)
    assert(readLines(chunks(0)) == readLines(csv))
  }

  test("an exactly-divisible body produces full chunks only") {
    val dir = tmp()
    val csv = writeCsv(dir, 200)
    val chunks = ChunkedUpload.split(csv, s"$dir/chunks", chunkLines = 100)
    assert(chunks.length == 2)
    assert(readLines(chunks(1)).length == 100)
  }

  test("a header-only file round-trips") {
    val dir = tmp()
    val csv = writeCsv(dir, 0)
    val chunks = ChunkedUpload.split(csv, s"$dir/chunks")
    assert(chunks.length == 1)
    val out = ChunkedUpload.reassemble(chunks, s"$dir/out.csv")
    assert(readLines(out) == readLines(csv))
  }

  test("rejects nonsensical chunk sizes and empty inputs") {
    val dir = tmp()
    val csv = writeCsv(dir, 5)
    intercept[IllegalArgumentException] { ChunkedUpload.split(csv, dir, chunkLines = 0) }
    intercept[IllegalArgumentException] { ChunkedUpload.reassemble(Nil, s"$dir/out.csv") }
  }

  test("chunked upload then Spark ingest equals direct ingest") {
    val dir = tmp()
    val csv = writeCsv(dir, 999)
    val chunks = ChunkedUpload.split(csv, s"$dir/chunks", chunkLines = 250)
    val re = ChunkedUpload.reassemble(chunks, s"$dir/server/data.csv")
    assert(readLines(re).length == 1000)
    assert(readLines(re) == readLines(csv))
  }
}
