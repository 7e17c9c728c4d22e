package repro.ml

/** Lloyd's k-means over dense feature vectors — the clustering substrate
  * for the model-clustering optimization (§4.1, Fig. 2(b)).
  */
final case class KMeansModel(centroids: Array[Array[Double]]) extends Serializable {
  def k: Int = centroids.length

  def assign(x: Array[Double]): Int = {
    var best = 0
    var bestD = Double.MaxValue
    var c = 0
    while (c < centroids.length) {
      val ct = centroids(c)
      var d = 0.0
      var i = 0
      while (i < x.length) { val diff = x(i) - ct(i); d += diff * diff; i += 1 }
      if (d < bestD) { bestD = d; best = c }
      c += 1
    }
    best
  }
}

object KMeans {

  /** @param x     training vectors (typically a sample of historical data —
    *              the paper runs clustering offline on a sample)
    * @param k     number of clusters
    * @param iters Lloyd iterations
    */
  def fit(x: Array[Array[Double]], k: Int, iters: Int = 20, seed: Long = 11): KMeansModel = {
    require(x.length >= k, s"need at least $k points, got ${x.length}")
    val d = x(0).length
    val rnd = new scala.util.Random(seed)
    // k-means++ seeding: each next center drawn ∝ squared distance to the
    // nearest chosen center — avoids the bad local optima of uniform init.
    def dist2(a: Array[Double], b: Array[Double]): Double = {
      var s = 0.0; var i = 0
      while (i < a.length) { val c = a(i) - b(i); s += c * c; i += 1 }
      s
    }
    val chosen = scala.collection.mutable.ArrayBuffer(x(rnd.nextInt(x.length)).clone())
    val minD = x.map(p => dist2(p, chosen.head))
    while (chosen.size < k) {
      val total = minD.sum
      val next =
        if (total <= 0) x(rnd.nextInt(x.length))
        else {
          var target = rnd.nextDouble() * total
          var i = 0
          while (i < x.length - 1 && target > minD(i)) { target -= minD(i); i += 1 }
          x(i)
        }
      chosen += next.clone()
      var i = 0
      while (i < x.length) { val nd = dist2(x(i), next); if (nd < minD(i)) minD(i) = nd; i += 1 }
    }
    var centroids = chosen.toArray
    val model = new Array[Int](x.length)

    var it = 0
    while (it < iters) {
      val km = KMeansModel(centroids)
      var changed = false
      var i = 0
      while (i < x.length) {
        val a = km.assign(x(i))
        if (a != model(i)) { model(i) = a; changed = true }
        i += 1
      }
      val sums = Array.fill(k, d)(0.0)
      val counts = new Array[Int](k)
      i = 0
      while (i < x.length) {
        val c = model(i)
        counts(c) += 1
        val xi = x(i)
        var j = 0
        while (j < d) { sums(c)(j) += xi(j); j += 1 }
        i += 1
      }
      centroids = Array.tabulate(k) { c =>
        if (counts(c) == 0) x(rnd.nextInt(x.length)).clone()
        else { val s = sums(c); var j = 0; while (j < d) { s(j) /= counts(c); j += 1 }; s }
      }
      if (!changed && it > 0) it = iters
      it += 1
    }
    KMeansModel(centroids)
  }
}
