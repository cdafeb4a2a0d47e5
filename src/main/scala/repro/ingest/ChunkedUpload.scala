package repro.ingest

import java.nio.charset.StandardCharsets
import java.nio.file.{Files, Path, Paths}
import scala.jdk.CollectionConverters._

/** The paper's scalable upload path (Section 3.2): "For scalably uploading
  * large datasets, we divide the file into 10,000 lines and send each
  * divided set to our system."
  *
  * [[split]] plays the browser side (divide `data.csv` into 10,000-line
  * chunks); [[reassemble]] plays the server side (receive chunks in order
  * and persist one logical file). The header travels only with chunk 0, as
  * a real uploader would send it once.
  */
object ChunkedUpload {

  val DefaultChunkLines = 10000

  /** Splits `csvPath` into `chunk-00000.csv`, `chunk-00001.csv`, … under
    * `outDir`; the header line stays on the first chunk only. Returns the
    * chunk paths in order.
    */
  def split(csvPath: String, outDir: String, chunkLines: Int = DefaultChunkLines): Seq[String] = {
    require(chunkLines > 0, s"chunkLines must be positive, got $chunkLines")
    val lines = Files.readAllLines(Paths.get(csvPath), StandardCharsets.UTF_8).asScala.toVector
    require(lines.nonEmpty, s"empty csv: $csvPath")
    val base = Paths.get(outDir)
    Files.createDirectories(base)
    val header = lines.head
    val body = lines.tail
    val groups = if (body.isEmpty) Seq(Vector.empty[String]) else body.grouped(chunkLines).toSeq
    groups.zipWithIndex.map { case (g, i) =>
      val content = if (i == 0) header +: g else g
      val p = base.resolve(f"chunk-$i%05d.csv")
      Files.write(p, content.mkString("\n").getBytes(StandardCharsets.UTF_8))
      p.toString
    }
  }

  /** Reassembles chunks (in the given order) into one file at `outPath`. */
  def reassemble(chunkPaths: Seq[String], outPath: String): String = {
    require(chunkPaths.nonEmpty, "no chunks to reassemble")
    val out: Path = Paths.get(outPath)
    Option(out.getParent).foreach(Files.createDirectories(_))
    val all = chunkPaths.flatMap(p => Files.readAllLines(Paths.get(p), StandardCharsets.UTF_8).asScala)
    Files.write(out, all.mkString("\n").getBytes(StandardCharsets.UTF_8))
    outPath
  }
}
