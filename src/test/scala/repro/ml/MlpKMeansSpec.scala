package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class MlpKMeansSpec extends AnyFunSuite {

  private val rnd = new scala.util.Random(23)

  test("MLP layer forward applies weights, bias, activation") {
    val layer = MlpLayer(Array(Array(1.0, -1.0), Array(2.0, 0.0)), Array(0.5, 0.0), "relu")
    val out = layer.forward(Array(1.0, 1.0))
    assert(out.toSeq == Seq(3.5, 0.0)) // (1+2+0.5, max(0,-1))
  }

  test("MLP predict chains layers to a single output") {
    val m = MlpModel(Seq(
      MlpLayer(Array(Array(1.0, 0.0), Array(0.0, 1.0)), Array(0.0, 0.0), "identity"),
      MlpLayer(Array(Array(1.0), Array(1.0)), Array(0.0), "sigmoid"),
    ))
    assert(math.abs(m.predict(Array(0.0, 0.0)) - 0.5) < 1e-9)
    assert(m.numFeatures == 2)
  }

  test("MLP shape validation") {
    assertThrows[IllegalArgumentException](
      MlpModel(Seq(MlpLayer(Array(Array(1.0, 1.0)), Array(0.0, 0.0), "relu"))))
  }

  test("MLP training learns a separable function") {
    val x = Array.fill(2000)(Array(rnd.nextGaussian(), rnd.nextGaussian()))
    val y = x.map(r => if (r(0) + r(1) > 0) 1.0 else 0.0)
    val m = MlpModel.train(x, y, hidden = Seq(8), epochs = 6, lr = 0.1, seed = 3)
    val acc = x.zip(y).count { case (r, l) => (m.predict(r) >= 0.5) == (l >= 0.5) }.toDouble / x.length
    assert(acc > 0.9, s"mlp accuracy $acc")
  }

  test("MLP training is deterministic given the seed") {
    val x = Array.fill(200)(Array(rnd.nextGaussian()))
    val y = x.map(r => if (r(0) > 0) 1.0 else 0.0)
    val a = MlpModel.train(x, y, Seq(4), epochs = 2, seed = 9)
    val b = MlpModel.train(x, y, Seq(4), epochs = 2, seed = 9)
    assert(a.predict(Array(0.3)) == b.predict(Array(0.3)))
  }

  test("MLP usedFeatures drops all-zero first-layer columns") {
    val m = MlpModel(Seq(
      MlpLayer(Array(Array(1.0, 1.0), Array(0.0, 0.0)), Array(0.0, 0.0), "relu"),
      MlpLayer(Array(Array(1.0), Array(1.0)), Array(0.0), "identity"),
    ))
    assert(m.usedFeatures == Set(0))
  }

  test("unknown activation throws") {
    assertThrows[IllegalArgumentException](MlpLayer.act("swish", 1.0))
  }

  test("kmeans recovers well-separated clusters") {
    val centers = Array(Array(0.0, 0.0), Array(10.0, 10.0), Array(-10.0, 10.0))
    val x = Array.fill(900)(()).zipWithIndex.map { case (_, i) =>
      val c = centers(i % 3)
      Array(c(0) + rnd.nextGaussian() * 0.5, c(1) + rnd.nextGaussian() * 0.5)
    }
    val km = KMeans.fit(x, 3, seed = 2)
    // every point's assigned centroid must be the closest true center
    val assignedCenters = x.map(p => km.centroids(km.assign(p)))
    x.zip(assignedCenters).foreach { case (p, c) =>
      val trueCenter = centers.minBy(tc => dist2(p, tc))
      assert(dist2(c, trueCenter) < 1.0, s"point ${p.toSeq} got centroid ${c.toSeq}")
    }
  }

  test("kmeans assign picks nearest centroid") {
    val km = KMeansModel(Array(Array(0.0), Array(10.0)))
    assert(km.assign(Array(1.0)) == 0)
    assert(km.assign(Array(9.0)) == 1)
    assert(km.k == 2)
  }

  test("kmeans requires enough points") {
    assertThrows[IllegalArgumentException](KMeans.fit(Array(Array(1.0)), 2))
  }

  test("kmeans is deterministic given the seed") {
    val x = Array.fill(200)(Array(rnd.nextGaussian(), rnd.nextGaussian()))
    val a = KMeans.fit(x, 4, seed = 7)
    val b = KMeans.fit(x, 4, seed = 7)
    assert(a.centroids.map(_.toSeq).toSeq == b.centroids.map(_.toSeq).toSeq)
  }

  private def dist2(a: Array[Double], b: Array[Double]): Double =
    a.zip(b).map { case (x, y) => (x - y) * (x - y) }.sum
}
