package repro.runtime

import java.nio.file.{Files, Path, Paths}

/** Out-of-process execution ("Raven Ext", §5): the engine spawns an
  * external runtime process per query, pipes the input rows out, and reads
  * predictions back. The constant ~0.5 s the paper reports is the
  * interpreter startup; here it is a real forked JVM running
  * [[ExternalRuntimeMain]].
  */
object OutOfProcess {

  final case class Result(rows: Long, checksum: Double, exitCode: Int)

  /** Classpath of the current (forked test) JVM — sufficient to launch the
    * external runtime against the same build.
    */
  def currentClasspath: String = System.getProperty("java.class.path")

  def run(modelDir: Path, csvPath: Path, batchSize: Int = 4096, mode: String = "nn"): Result = {
    val pb = new ProcessBuilder(
      javaBin, "-Xmx2g", "-cp", currentClasspath,
      "repro.runtime.ExternalRuntimeMain", modelDir.toString, batchSize.toString, mode)
    pb.redirectErrorStream(false)
    val proc = pb.start()

    // writer thread: stream the CSV into the child's stdin
    val writer = new Thread(() => {
      val out = proc.getOutputStream
      try Files.copy(csvPath, out)
      finally out.close()
    }, "oop-writer")
    writer.setDaemon(true)
    writer.start()

    var rows = 0L
    var checksum = 0.0
    val reader = CsvData.readerOf(proc.getInputStream)
    var line = reader.readLine()
    while (line != null) {
      rows += 1
      checksum += java.lang.Double.parseDouble(line)
      line = reader.readLine()
    }
    writer.join()
    val exit = proc.waitFor()
    Result(rows, checksum, exit)
  }

  private def javaBin: String =
    Paths.get(System.getProperty("java.home"), "bin", "java").toString
}
