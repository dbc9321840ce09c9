package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.data.TextStream
import repro.data.TextStream.Message

/** Tests for the multinomial Naive Bayes substrate. */
class NaiveBayesSpec extends AnyFunSuite {

  private def msg(words: Map[Int, Int], label: Boolean) = Message(words, label)

  test("separable vocabularies are classified perfectly") {
    val train = Vector(
      msg(Map(0 -> 3, 1 -> 2), label = true),
      msg(Map(0 -> 2, 1 -> 4), label = true),
      msg(Map(5 -> 3, 6 -> 2), label = false),
      msg(Map(5 -> 1, 6 -> 5), label = false),
    )
    val m = NaiveBayes.train(train, 10)
    assert(NaiveBayes.predict(m, msg(Map(0 -> 1, 1 -> 1), label = true)))
    assert(!NaiveBayes.predict(m, msg(Map(5 -> 2, 6 -> 1), label = false)))
  }

  test("unseen words are Laplace-smoothed, not fatal") {
    val train = Vector(msg(Map(0 -> 1), label = true), msg(Map(1 -> 1), label = false))
    val m = NaiveBayes.train(train, 10)
    // Word 9 never appeared; prediction must still be well-defined.
    val p = NaiveBayes.predict(m, msg(Map(9 -> 3), label = true))
    assert(p || !p) // no exception, finite scores
  }

  test("missRate with empty training set is 1 (no model, always wrong)") {
    assert(NaiveBayes.missRate(Vector.empty, Vector(msg(Map(0 -> 1), label = true)), 10) == 1.0)
  }

  test("missRate with empty test batch is 0") {
    assert(NaiveBayes.missRate(Vector(msg(Map(0 -> 1), label = true)), Vector.empty, 10) == 0.0)
  }

  test("synthetic Usenet2 stream is learnable within a context segment") {
    val batches = TextStream.stream(seed = 42)
    // Train on batches 1-4 (one interest context), test on batch 5 (same context).
    val train = batches.take(4).flatten.map(_.payload)
    val test = batches(4).map(_.payload)
    val miss = NaiveBayes.missRate(train, test, TextStream.VocabSize)
    assert(miss < 0.25, s"miss=$miss should be well below chance within one context")
  }

  test("model trained on one context fails after the interest flip") {
    val batches = TextStream.stream(seed = 43)
    val train = batches.take(6).flatten.map(_.payload) // messages 0-299: context A
    val test = batches(6).map(_.payload) // messages 300-349: context B (flipped)
    val miss = NaiveBayes.missRate(train, test, TextStream.VocabSize)
    assert(miss > 0.5, s"miss=$miss should exceed chance right after the flip")
  }
}
