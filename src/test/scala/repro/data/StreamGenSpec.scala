package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Rng
import repro.data.StreamGen._

/** Tests for the evolving-stream generators and temporal patterns. */
class StreamGenSpec extends AnyFunSuite {

  test("SingleEvent: abnormal exactly in (start, end]") {
    val p = SingleEvent(10, 20)
    assert(!p.abnormalAt(1) && !p.abnormalAt(10))
    assert(p.abnormalAt(11) && p.abnormalAt(20))
    assert(!p.abnormalAt(21) && !p.abnormalAt(100))
  }

  test("Periodic(10,10): 10 normal then 10 abnormal, repeating") {
    val p = Periodic(10, 10)
    (1 to 10).foreach(t => assert(!p.abnormalAt(t), s"t=$t"))
    (11 to 20).foreach(t => assert(p.abnormalAt(t), s"t=$t"))
    (21 to 30).foreach(t => assert(!p.abnormalAt(t), s"t=$t"))
    (31 to 40).foreach(t => assert(p.abnormalAt(t), s"t=$t"))
  }

  test("Periodic(16,16) and P(10,5) cycle lengths") {
    val a = Periodic(16, 16)
    assert(!a.abnormalAt(16) && a.abnormalAt(17) && a.abnormalAt(32) && !a.abnormalAt(33))
    val b = Periodic(10, 5)
    assert(!b.abnormalAt(10) && b.abnormalAt(11) && b.abnormalAt(15) && !b.abnormalAt(16))
  }

  test("batch regimes: constant, uniform, geometric") {
    val rng = new Rng(1)
    assert(ConstantBatch(100).sizeAt(50, rng) == 100)
    val u = UniformBatch(100)
    val draws = Vector.fill(2000)(u.sizeAt(1, rng))
    assert(draws.forall(s => s >= 0 && s <= 200))
    assert(math.abs(draws.sum.toDouble / draws.size - 100.0) < 5.0)
    val g = GeometricBatch(100, 1.002)
    assert(g.sizeAt(0, rng) == 100)
    assert(g.sizeAt(200, rng) == math.round(100 * math.pow(1.002, 200)).toInt)
    val d = GeometricBatch(100, 0.8)
    assert(d.sizeAt(20, rng) < 2)
    assert(d.base == 100 && u.base == 100)
  }

  test("GaussianMixture: centroids fixed per seed, inside [0,80]^2") {
    val m1 = new GaussianMixture(7); val m2 = new GaussianMixture(7)
    assert(m1.centroids == m2.centroids)
    assert(m1.centroids.size == 100)
    m1.centroids.foreach { case (x, y) => assert(x >= 0 && x <= 80 && y >= 0 && y <= 80) }
  }

  test("GaussianMixture: normal mode favours classes 0-49 five to one") {
    val m = new GaussianMixture(8)
    val rng = new Rng(9)
    val draws = Vector.fill(30000)(m.draw(abnormal = false, rng))
    val firstHalf = draws.count(_.label < 50).toDouble / draws.size
    assert(math.abs(firstHalf - 5.0 / 6.0) < 0.02, s"firstHalf=$firstHalf")
    draws.foreach(p => assert(p.label >= 0 && p.label < 100))
  }

  test("GaussianMixture: abnormal mode inverts the class frequencies") {
    val m = new GaussianMixture(10)
    val rng = new Rng(11)
    val draws = Vector.fill(30000)(m.draw(abnormal = true, rng))
    val firstHalf = draws.count(_.label < 50).toDouble / draws.size
    assert(math.abs(firstHalf - 1.0 / 6.0) < 0.02, s"firstHalf=$firstHalf")
  }

  test("GaussianMixture: points are near their class centroid (sigma=1)") {
    val m = new GaussianMixture(12)
    val rng = new Rng(13)
    val draws = Vector.fill(5000)(m.draw(abnormal = false, rng))
    draws.foreach { p =>
      val (cx, cy) = m.centroids(p.label)
      assert(math.hypot(p.x - cx, p.y - cy) < 6.0, "more than 6 sigma from centroid")
    }
  }

  test("RegressionModel draws from the mode's coefficients") {
    val rng = new Rng(14)
    val normal = Vector.fill(10000)(RegressionModel.draw(abnormal = false, rng))
    normal.foreach { o => assert(o.x1 >= 0 && o.x1 < 1 && o.x2 >= 0 && o.x2 < 1) }
    val resid = normal.map(o => o.y - (4.2 * o.x1 - 0.4 * o.x2))
    val mean = resid.sum / resid.size
    assert(math.abs(mean) < 0.05, s"residual mean $mean")
  }

  test("knnBatch / regBatch produce the requested size, batch tag and distinct ids") {
    val m = new GaussianMixture(15)
    val rng = new Rng(16)
    val kb = StreamGen.knnBatch(m, Periodic(2, 2), t = 3, size = 25, rng, idBase = 1000)
    assert(kb.size == 25 && kb.forall(_.batch == 3))
    assert(kb.map(_.id).distinct.size == 25 && kb.head.id == 1000)
    val rb = StreamGen.regBatch(SingleEvent(), t = 1, size = 10, rng, idBase = 0)
    assert(rb.size == 10 && rb.map(_.id).distinct.size == 10)
  }
}
