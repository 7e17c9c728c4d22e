package repro.runtime

import java.io.{BufferedReader, BufferedWriter, InputStreamReader, OutputStreamWriter}
import java.nio.file.{Files, Path}

/** Minimal CSV I/O for the standalone / out-of-process runtimes (the data
  * interchange outside the database engine, which the paper's standalone
  * ORT and external-script paths pay for).
  *
  * No quoting: the synthetic datasets contain no commas.
  */
object CsvData {

  def write(rows: Iterator[IndexedSeq[Any]], path: Path): Long = {
    val w = new BufferedWriter(new OutputStreamWriter(Files.newOutputStream(path)), 1 << 20)
    var n = 0L
    try {
      rows.foreach { r =>
        w.write(r.mkString(","))
        w.newLine()
        n += 1
      }
    } finally w.close()
    n
  }

  def readBatches(path: Path, batchSize: Int): Iterator[IndexedSeq[IndexedSeq[Any]]] = {
    val reader = Files.newBufferedReader(path)
    linesBatches(reader, batchSize)
  }

  def linesBatches(reader: BufferedReader, batchSize: Int): Iterator[IndexedSeq[IndexedSeq[Any]]] =
    new Iterator[IndexedSeq[IndexedSeq[Any]]] {
      private var nextLine: String = reader.readLine()
      def hasNext: Boolean = nextLine != null
      def next(): IndexedSeq[IndexedSeq[Any]] = {
        val buf = IndexedSeq.newBuilder[IndexedSeq[Any]]
        var i = 0
        while (i < batchSize && nextLine != null) {
          buf += parse(nextLine)
          nextLine = reader.readLine()
          i += 1
        }
        if (nextLine == null) reader.close()
        buf.result()
      }
    }

  /** Numbers parse to Double, everything else stays a String. */
  def parse(line: String): IndexedSeq[Any] =
    line.split(",", -1).toIndexedSeq.map { s =>
      try java.lang.Double.parseDouble(s): Any
      catch { case _: NumberFormatException => s: Any }
    }

  def readerOf(in: java.io.InputStream): BufferedReader =
    new BufferedReader(new InputStreamReader(in), 1 << 20)
}
