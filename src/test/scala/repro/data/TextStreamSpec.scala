package repro.data

import org.scalatest.funsuite.AnyFunSuite

/** Tests for the synthetic Usenet2 stand-in stream. */
class TextStreamSpec extends AnyFunSuite {

  test("stream shape matches the paper's setup: 30 batches of 50 messages") {
    val batches = TextStream.stream(seed = 1)
    assert(batches.size == 30)
    assert(batches.forall(_.size == 50))
    assert(batches.flatten.size == 1500)
  }

  test("interest flips every 300 messages (recurring contexts)") {
    assert(TextStream.interestingTopic(0) == 0)
    assert(TextStream.interestingTopic(299) == 0)
    assert(TextStream.interestingTopic(300) == 1)
    assert(TextStream.interestingTopic(599) == 1)
    assert(TextStream.interestingTopic(600) == 0) // context A recurs
    assert(TextStream.interestingTopic(1200) == 0)
  }

  test("word ids stay inside the vocabulary") {
    val batches = TextStream.stream(seed = 2)
    batches.flatten.foreach { item =>
      item.payload.counts.keys.foreach(w => assert(w >= 0 && w < TextStream.VocabSize))
      assert(item.payload.counts.values.sum == 30)
    }
  }

  test("labels are balanced-ish: one of three topics is interesting") {
    val batches = TextStream.stream(seed = 3)
    val frac = batches.flatten.count(_.payload.interesting).toDouble / 1500
    assert(math.abs(frac - 1.0 / 3) < 0.05, s"interesting fraction $frac")
  }

  test("deterministic per seed, different across seeds") {
    val a = TextStream.stream(seed = 4).flatten.map(_.payload)
    val b = TextStream.stream(seed = 4).flatten.map(_.payload)
    val c = TextStream.stream(seed = 5).flatten.map(_.payload)
    assert(a == b)
    assert(a != c)
  }

  test("batch indices are 1-based and contiguous") {
    val batches = TextStream.stream(seed = 6)
    batches.zipWithIndex.foreach { case (batch, i) =>
      assert(batch.forall(_.batch == i + 1))
    }
  }
}
