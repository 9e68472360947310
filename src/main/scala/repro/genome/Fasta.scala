package repro.genome

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import java.nio.charset.StandardCharsets
import java.nio.file.{Files, Path}

/** FASTA substrate: the input format the paper's datasets arrive in.
  *
  * A FASTA file is a sequence of records, each a `>header` line followed by
  * sequence lines (conventionally wrapped at 60–80 columns). This module
  * provides a writer, a strict parser, and a Spark directory reader producing
  * a (file, header, sequence) DataFrame, so the end-to-end path
  * `FASTA dir → k-mers → RAMBO` is exercised by real format handling rather
  * than pre-tokenised inputs.
  */
object Fasta {

  /** One FASTA record: header (without the leading '>') and its sequence. */
  final case class Record(header: String, sequence: String)

  /** Render records as FASTA text with sequence lines wrapped at `wrap`. */
  def format(records: Seq[Record], wrap: Int = 70): String = {
    require(wrap > 0, s"wrap must be > 0, got $wrap")
    val sb = new StringBuilder
    records.foreach { r =>
      sb.append('>').append(r.header).append('\n')
      var i = 0
      while (i < r.sequence.length) {
        val end = math.min(i + wrap, r.sequence.length)
        sb.append(r.sequence.substring(i, end)).append('\n')
        i = end
      }
    }
    sb.toString
  }

  /** Parse FASTA text into records. Blank lines are ignored; sequence data
    * before the first header is rejected.
    */
  def parse(text: String): Seq[Record] = {
    val out = Vector.newBuilder[Record]
    var header: String = null
    val seq = new StringBuilder
    def flush(): Unit = if (header != null) { out += Record(header, seq.toString); seq.clear() }
    text.linesIterator.foreach { raw =>
      val line = raw.trim
      if (line.nonEmpty) {
        if (line.charAt(0) == '>') { flush(); header = line.substring(1).trim }
        else {
          require(header != null, s"sequence data before first FASTA header: '$line'")
          seq.append(line)
        }
      }
    }
    flush()
    out.result()
  }

  /** Write one FASTA file; returns its path. */
  def write(path: Path, records: Seq[Record], wrap: Int = 70): Path =
    Files.write(path, format(records, wrap).getBytes(StandardCharsets.UTF_8))

  /** Read a directory of `*.fasta` files into (file_name, header, sequence).
    *
    * Uses Spark's whole-file text reader plus `input_file_name()` so parsing
    * distributes across executors — this is the "distributed map over
    * partitioned genomic files" entry point of the construction pipeline.
    */
  def readDirectory(spark: SparkSession, dir: String): DataFrame = {
    import spark.implicits._
    val parseUdf = udf((text: String) =>
      parse(text).map(r => (r.header, r.sequence)))
    spark.read
      .option("wholetext", "true")
      .text(dir + "/*.fasta")
      .select(
        element_at(split(input_file_name(), "/"), -1) as "file_name",
        parseUdf($"value") as "records")
      .select($"file_name", explode($"records") as "rec")
      .select($"file_name", $"rec._1" as "header", $"rec._2" as "sequence")
  }
}
