package repro.onnx

import java.io._
import java.nio.file.{Files, Path}

/** On-disk serialization for OnnxLite graphs — a small explicit binary
  * format (not Java serialization) so model files are stable, compact,
  * and loading cost is a real, measurable quantity for the standalone
  * "ORT" backend which re-reads the model on every query.
  */
object ModelFormat {

  private val Magic = 0x4f4c4954 // "OLIT"
  private val Version = 1

  def save(graph: GraphDef, path: Path): Unit = {
    val out = new DataOutputStream(new BufferedOutputStream(Files.newOutputStream(path)))
    try {
      out.writeInt(Magic); out.writeInt(Version)
      writeString(out, graph.name)
      writeSeq(out, graph.inputs)(writeString(out, _))
      writeString(out, graph.output)
      out.writeInt(graph.initializers.size)
      graph.initializers.foreach { case (name, t) =>
        writeString(out, name)
        out.writeInt(t.rows); out.writeInt(t.cols)
        t.data.foreach(out.writeFloat)
      }
      out.writeInt(graph.nodes.size)
      graph.nodes.foreach { n =>
        writeString(out, n.op)
        writeSeq(out, n.inputs)(writeString(out, _))
        writeString(out, n.output)
        out.writeInt(n.attrs.size)
        n.attrs.foreach { case (k, v) => writeString(out, k); out.writeFloat(v) }
      }
    } finally out.close()
  }

  def load(path: Path): GraphDef = {
    val in = new DataInputStream(new BufferedInputStream(Files.newInputStream(path)))
    try {
      require(in.readInt() == Magic, s"$path: not an OnnxLite model")
      require(in.readInt() == Version, s"$path: unsupported model version")
      val name = readString(in)
      val inputs = readSeq(in)(readString(in))
      val output = readString(in)
      val initializers = (0 until in.readInt()).map { _ =>
        val iname = readString(in)
        val rows = in.readInt(); val cols = in.readInt()
        val data = Array.fill(rows * cols)(in.readFloat())
        iname -> new repro.linalg.Tensor(rows, cols, data)
      }.toMap
      val nodes = (0 until in.readInt()).map { _ =>
        val op = readString(in)
        val nin = readSeq(in)(readString(in))
        val nout = readString(in)
        val attrs = (0 until in.readInt()).map(_ => readString(in) -> in.readFloat()).toMap
        NodeDef(op, nin, nout, attrs)
      }
      GraphDef(name, inputs, output, initializers, nodes).validated
    } finally in.close()
  }

  private def writeString(out: DataOutputStream, s: String): Unit = out.writeUTF(s)
  private def readString(in: DataInputStream): String = in.readUTF()

  private def writeSeq[A](out: DataOutputStream, xs: Seq[A])(w: A => Unit): Unit = {
    out.writeInt(xs.size); xs.foreach(w)
  }
  private def readSeq[A](in: DataInputStream)(r: => A): Seq[A] =
    (0 until in.readInt()).map(_ => r)
}
