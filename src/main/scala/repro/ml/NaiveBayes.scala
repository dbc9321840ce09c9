package repro.ml

import repro.data.TextStream.Message

/** Multinomial Naive Bayes with a bag-of-words model and Laplace smoothing
  * (§6.4), for the binary "interesting / not interesting" task.
  */
object NaiveBayes {

  /** Trained model: log priors and per-class log word probabilities. */
  final case class Model(logPrior: Array[Double], logWordProb: Array[Array[Double]])

  /** Train on labeled messages over a vocabulary of `vocabSize` words. */
  def train(msgs: IndexedSeq[Message], vocabSize: Int): Model = {
    val classCount = new Array[Double](2)
    val wordCount = Array.ofDim[Double](2, vocabSize)
    val totalWords = new Array[Double](2)
    msgs.foreach { m =>
      val c = if (m.interesting) 1 else 0
      classCount(c) += 1
      m.counts.foreach { case (w, n) => wordCount(c)(w) += n; totalWords(c) += n }
    }
    val n = math.max(1.0, msgs.size.toDouble)
    val logPrior = Array.tabulate(2)(c => math.log((classCount(c) + 1.0) / (n + 2.0)))
    val logWordProb = Array.tabulate(2, vocabSize) { (c, w) =>
      math.log((wordCount(c)(w) + 1.0) / (totalWords(c) + vocabSize))
    }
    Model(logPrior, logWordProb)
  }

  /** Predict whether a message is interesting. */
  def predict(model: Model, m: Message): Boolean = {
    var s0 = model.logPrior(0); var s1 = model.logPrior(1)
    m.counts.foreach { case (w, n) =>
      s0 += n * model.logWordProb(0)(w)
      s1 += n * model.logWordProb(1)(w)
    }
    s1 > s0
  }

  /** Misclassification rate of the sample-trained model on a test batch. */
  def missRate(train0: IndexedSeq[Message], test: IndexedSeq[Message], vocabSize: Int): Double = {
    if (test.isEmpty) return 0.0
    if (train0.isEmpty) return 1.0
    val model = train(train0, vocabSize)
    test.count(m => predict(model, m) != m.interesting).toDouble / test.size
  }
}
