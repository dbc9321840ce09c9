package repro.ml

import repro.data.StreamGen.Point

/** k-nearest-neighbour classifier (§6.2): predicts the majority class of the
  * k Euclidean-nearest training points. Non-parametric — exactly the kind of
  * model the paper argues cannot be re-engineered to be adaptive, motivating
  * retraining on a maintained sample.
  */
object Knn {

  /** Predict the class of (x, y) from `train` by majority vote of the k
    * nearest neighbours (ties broken by the smaller class id for
    * determinism). Returns −1 on an empty training set.
    */
  def predict(train: IndexedSeq[Point], x: Double, y: Double, k: Int): Int = {
    if (train.isEmpty) return -1
    val kk = math.min(k, train.size)
    // Partial selection of the k smallest distances: O(|train|·k) with k=7 is
    // cheaper and allocation-free compared to a full sort.
    val bestDist = Array.fill(kk)(Double.MaxValue)
    val bestLabel = Array.fill(kk)(-1)
    var i = 0
    while (i < train.size) {
      val p = train(i)
      val dx = p.x - x; val dy = p.y - y
      val d = dx * dx + dy * dy
      if (d < bestDist(kk - 1)) {
        // insertion into the sorted top-k
        var j = kk - 1
        while (j > 0 && bestDist(j - 1) > d) {
          bestDist(j) = bestDist(j - 1); bestLabel(j) = bestLabel(j - 1); j -= 1
        }
        bestDist(j) = d; bestLabel(j) = p.label
      }
      i += 1
    }
    val votes = scala.collection.mutable.Map.empty[Int, Int].withDefaultValue(0)
    bestLabel.foreach(l => if (l >= 0) votes(l) += 1)
    votes.toSeq.maxBy { case (label, count) => (count, -label) }._1
  }

  /** Misclassification rate of the sample-trained classifier on a test batch. */
  def missRate(train: IndexedSeq[Point], test: IndexedSeq[Point], k: Int): Double = {
    if (test.isEmpty) return 0.0
    val wrong = test.count(p => predict(train, p.x, p.y, k) != p.label)
    wrong.toDouble / test.size
  }
}
