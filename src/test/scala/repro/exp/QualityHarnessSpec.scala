package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.data.StreamGen._
import repro.exp.QualityHarness.Config

/** Tests for the prequential harness and small-scale versions of the §6.2
  * quality findings (the full-scale versions live in the bench suites).
  */
class QualityHarnessSpec extends AnyFunSuite {

  private val smallCfg = Config(warmup = 30, horizon = 30, accFrom = 1, esFrom = 15, esZ = 0.1)

  private def knnResult(mk: Long => Sampler[Point], pattern: Pattern, runs: Int = 3,
                        n: Int = 300): QualityHarness.SchemeResult =
    Experiments.knn(mk, pattern, ConstantBatch(100), smallCfg, runs, seed = 11)

  test("trace has one loss per post-warm-up batch") {
    val res = knnResult(s => new RTBS[Point](300, 0.1, s), SingleEvent(5, 10))
    assert(res.trace.size == 30)
    res.trace.foreach(l => assert(l >= 0.0 && l <= 1.0))
  }

  test("losses spike at a mode change and recover for adaptive samplers") {
    val res = knnResult(s => new RTBS[Point](300, 0.1, s), SingleEvent(5, 10), runs = 4)
    val before = res.trace.take(5) // normal mode, warmed up
    val spike = res.trace(5) // first abnormal batch
    val recovered = res.trace.slice(8, 10) // after adaptation
    assert(spike > 2 * before.max, s"spike=$spike before=${before.max}")
    assert(recovered.min < spike * 0.8, "R-TBS should adapt within a few batches")
  }

  test("uniform reservoir does not adapt to a mode change") {
    val rtbs = knnResult(s => new RTBS[Point](300, 0.1, s), SingleEvent(5, 20), runs = 4)
    val unif = knnResult(s => new BRS[Point](300, s), SingleEvent(5, 20), runs = 4)
    // Late in the abnormal period (t=15..20) R-TBS has adapted, Unif has not.
    val rtbsLate = rtbs.trace.slice(14, 20).sum / 6
    val unifLate = unif.trace.slice(14, 20).sum / 6
    assert(unifLate > rtbsLate + 0.1, s"unif=$unifLate rtbs=$rtbsLate")
  }

  test("sliding window spikes when an old pattern reasserts itself") {
    val sw = knnResult(_ => new SlidingWindow[Point](300), SingleEvent(5, 10), runs = 4)
    val rtbs = knnResult(s => new RTBS[Point](300, 0.1, s), SingleEvent(5, 10), runs = 4)
    // Right after the snap-back at t=10 the window is full of abnormal data;
    // R-TBS retained old normal-mode data and stays low. Compare the worst
    // post-snap-back batch.
    val swWorst = sw.trace.slice(10, 16).max
    val rtbsWorst = rtbs.trace.slice(10, 16).max
    assert(swWorst > rtbsWorst, s"sw=$swWorst rtbs=$rtbsWorst")
  }

  test("evaluate aggregates accuracy over accFrom and ES over esFrom windows") {
    // Deterministic loss equal to t/100 lets us check the windows exactly.
    val mk = (_: Long) => new SlidingWindow[Int](10): Sampler[Int]
    val factory = (_: Long) => (t: Int, size: Int, _: Rng, idBase: Long) =>
      (0 until size).map(i => Item(idBase + i, t, t))
    val cfg = Config(warmup = 0, horizon = 10, accFrom = 3, esFrom = 6, esZ = 0.5)
    val res = QualityHarness.evaluate[Int](
      mk, factory, ConstantBatch(1),
      (_, batch) => batch.head / 100.0,
      cfg, runs = 2, seed = 1)
    // accuracy = mean(3..10)/100; ES = mean of worst 3 of {6..10}/100 (ceil(0.5*5)=3)
    assert(math.abs(res.accuracy - (3 to 10).sum / 8.0 / 100) < 1e-12)
    assert(math.abs(res.es - (10 + 9 + 8) / 3.0 / 100) < 1e-12)
    assert(res.trace == Vector.tabulate(10)(i => (i + 1) / 100.0))
  }

  test("singleRun is deterministic in the seed") {
    val factory = (runSeed: Long) => {
      val mix = new GaussianMixture(runSeed)
      (t: Int, size: Int, rng: Rng, idBase: Long) =>
        repro.data.StreamGen.knnBatch(mix, Periodic(3, 3), math.max(t, 1), size, rng, idBase)
    }
    def run(): Vector[Double] = QualityHarness.singleRun[Point](
      s => new RTBS[Point](100, 0.1, s), factory(99L), ConstantBatch(50),
      (s, b) => repro.ml.Knn.missRate(s, b, 3),
      Config(5, 10, 1, 5, 0.2), runSeed = 99L)
    assert(run() == run())
  }

  test("naiveBayes experiment runs end to end with sane outputs") {
    val schemes: Seq[(String, Long => Sampler[repro.data.TextStream.Message])] = Seq(
      ("R-TBS", s => new RTBS[repro.data.TextStream.Message](300, 0.3, s)),
      ("SW", _ => new SlidingWindow[repro.data.TextStream.Message](300)),
    )
    val out = Experiments.naiveBayes(schemes, runs = 2, seed = 5)
    assert(out.size == 2)
    out.foreach { case (name, miss, es) =>
      assert(miss > 0 && miss < 60, s"$name miss=$miss")
      assert(es >= miss, s"$name es=$es should be at least the mean miss")
    }
  }

  test("formatTable aligns columns") {
    val t = Experiments.formatTable(Seq("a", "bbbb"), Seq(Seq("xx", "y"), Seq("1", "22")))
    val lines = t.split("\n")
    assert(lines.length == 4)
    assert(lines.map(_.length).distinct.size == 1, "all lines same width")
  }
}
