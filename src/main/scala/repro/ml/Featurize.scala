package repro.ml

/** One-hot encoding of a categorical column into a block of 0/1 features —
  * the MLD-category featurizer of the paper's IR (§3.1).
  *
  * Unknown categories encode to the all-zero vector (scikit-learn's
  * `handle_unknown='ignore'`).
  */
final case class OneHotEncoder(inputCol: String, categories: IndexedSeq[String]) extends Serializable {
  require(categories.distinct.size == categories.size, s"$inputCol: duplicate categories")

  def width: Int = categories.size

  private val index: Map[String, Int] = categories.zipWithIndex.toMap

  /** Category index, or -1 for unseen values. */
  def indexOf(value: String): Int = index.getOrElse(value, -1)

  def encode(value: String, out: Array[Double], offset: Int): Unit = {
    val i = indexOf(value)
    if (i >= 0) out(offset + i) = 1.0
  }
}

/** A featurization pipeline: a fixed layout of numeric passthrough columns
  * followed by one-hot blocks, mapping raw table rows to model feature
  * vectors.
  *
  * The layout is the contract shared by the trainers, the NN translator,
  * the cross-optimizer (predicates on raw columns are translated into
  * constraints on feature indices through it), and the runtimes.
  */
final case class FeaturePipeline(
    numericCols: Seq[String],
    encoders: Seq[OneHotEncoder],
) extends Serializable {

  /** Raw input columns in feed order: numerics first, then categoricals. */
  def inputCols: Seq[String] = numericCols ++ encoders.map(_.inputCol)

  def numFeatures: Int = numericCols.size + encoders.map(_.width).sum

  /** Human-readable name per feature index: `age`, `dest=JFK`, ... */
  lazy val featureNames: IndexedSeq[String] =
    (numericCols ++ encoders.flatMap(e => e.categories.map(c => s"${e.inputCol}=$c"))).toIndexedSeq

  /** Feature index of a numeric column. */
  def numericIndex(col: String): Int = {
    val i = numericCols.indexOf(col)
    require(i >= 0, s"'$col' is not a numeric pipeline column")
    i
  }

  /** (block start offset, encoder) for a categorical column. */
  def encoderBlock(col: String): (Int, OneHotEncoder) = {
    var off = numericCols.size
    encoders.foreach { e =>
      if (e.inputCol == col) return (off, e)
      off += e.width
    }
    throw new IllegalArgumentException(s"'$col' is not an encoded pipeline column")
  }

  def isCategorical(col: String): Boolean = encoders.exists(_.inputCol == col)

  /** The raw input column that produces feature index `f`. */
  def sourceColumn(f: Int): String = {
    require(f >= 0 && f < numFeatures, s"feature index $f out of range")
    if (f < numericCols.size) numericCols(f)
    else {
      var off = numericCols.size
      encoders.foreach { e =>
        if (f < off + e.width) return e.inputCol
        off += e.width
      }
      throw new IllegalStateException("unreachable")
    }
  }

  /** Featurize one raw row given in [[inputCols]] order (numerics as
    * numbers, categoricals as strings).
    */
  def transform(raw: IndexedSeq[Any]): Array[Double] = {
    require(raw.size == inputCols.size, s"expected ${inputCols.size} values, got ${raw.size}")
    val out = new Array[Double](numFeatures)
    var i = 0
    while (i < numericCols.size) { out(i) = toDouble(raw(i)); i += 1 }
    var off = numericCols.size
    var e = 0
    while (e < encoders.size) {
      val enc = encoders(e)
      enc.encode(String.valueOf(raw(numericCols.size + e)), out, off)
      off += enc.width
      e += 1
    }
    out
  }

  /** Raw row → per-column feed values for an NN-translated pipeline graph:
    * numerics pass through, categoricals become category indices (the
    * vocabulary lookup an ONNX-ML LabelEncoder would perform in-graph).
    */
  def toGraphFeeds(raw: IndexedSeq[Any]): Array[Double] = {
    val out = new Array[Double](inputCols.size)
    var i = 0
    while (i < numericCols.size) { out(i) = toDouble(raw(i)); i += 1 }
    var e = 0
    while (e < encoders.size) {
      out(numericCols.size + e) = encoders(e).indexOf(String.valueOf(raw(numericCols.size + e))).toDouble
      e += 1
    }
    out
  }

  /** Restrict the pipeline to a subset of raw input columns (model-projection
    * pushdown: drop columns whose features were all pruned).
    */
  def project(keepCols: Set[String]): FeaturePipeline =
    FeaturePipeline(numericCols.filter(keepCols), encoders.filter(e => keepCols.contains(e.inputCol)))

  private def toDouble(v: Any): Double = v match {
    case null       => 0.0
    case d: Double  => d
    case f: Float   => f.toDouble
    case i: Int     => i.toDouble
    case l: Long    => l.toDouble
    case s: Short   => s.toDouble
    case b: Byte    => b.toDouble
    case b: Boolean => if (b) 1.0 else 0.0
    case d: java.math.BigDecimal => d.doubleValue
    case s: String  => s.toDouble
    case other => throw new IllegalArgumentException(s"non-numeric value $other")
  }
}

/** Standardization (z-score) of numeric features; used ahead of MLP models. */
final case class StandardScaler(means: Array[Double], stds: Array[Double]) extends Serializable {
  def transform(x: Array[Double]): Array[Double] = {
    val out = new Array[Double](x.length)
    var i = 0
    while (i < x.length) { out(i) = (x(i) - means(i)) / stds(i); i += 1 }
    out
  }
}

object StandardScaler {
  def fit(rows: Array[Array[Double]]): StandardScaler = {
    require(rows.nonEmpty, "cannot fit scaler on empty data")
    val n = rows.length
    val d = rows(0).length
    val means = new Array[Double](d)
    rows.foreach { r => var i = 0; while (i < d) { means(i) += r(i); i += 1 } }
    var i = 0
    while (i < d) { means(i) /= n; i += 1 }
    val vars = new Array[Double](d)
    rows.foreach { r =>
      var j = 0
      while (j < d) { val c = r(j) - means(j); vars(j) += c * c; j += 1 }
    }
    val stds = vars.map(v => math.max(math.sqrt(v / n), 1e-9))
    StandardScaler(means, stds)
  }
}
