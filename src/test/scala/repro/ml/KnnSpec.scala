package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.data.StreamGen.Point

/** Tests for the kNN substrate. */
class KnnSpec extends AnyFunSuite {

  test("empty training set returns -1") {
    assert(Knn.predict(Vector.empty, 0, 0, 7) == -1)
  }

  test("single training point always wins") {
    val train = Vector(Point(1, 1, 42))
    assert(Knn.predict(train, 100, 100, 7) == 42)
  }

  test("nearest neighbour dominates with k=1") {
    val train = Vector(Point(0, 0, 1), Point(10, 10, 2))
    assert(Knn.predict(train, 1, 1, 1) == 1)
    assert(Knn.predict(train, 9, 9, 1) == 2)
  }

  test("majority vote of k=3 beats a single closer outlier") {
    val train = Vector(Point(0, 0, 9), Point(2, 0, 5), Point(0, 2, 5), Point(2, 2, 5))
    // Query at (0.1, 0.1): closest is label 9, but labels 5 are the 3-NN majority.
    assert(Knn.predict(train, 1.0, 1.0, 3) == 5)
  }

  test("k larger than training set degrades gracefully") {
    val train = Vector(Point(0, 0, 1), Point(1, 1, 1), Point(5, 5, 2))
    assert(Knn.predict(train, 0, 0, 100) == 1)
  }

  test("tie-break is deterministic (smaller label)") {
    val train = Vector(Point(0, 1, 2), Point(1, 0, 1))
    assert(Knn.predict(train, 0, 0, 2) == 1)
  }

  test("missRate on separable clusters is zero") {
    val a = (0 until 20).map(i => Point(i * 0.01, 0, 1))
    val b = (0 until 20).map(i => Point(50 + i * 0.01, 0, 2))
    val train = (a ++ b).toVector
    val test = Vector(Point(0.5, 0, 1), Point(50.5, 0, 2))
    assert(Knn.missRate(train, test, 3) == 0.0)
  }

  test("missRate of empty test batch is zero") {
    assert(Knn.missRate(Vector(Point(0, 0, 1)), Vector.empty, 3) == 0.0)
  }

  test("missRate counts wrong predictions") {
    val train = Vector.fill(10)(Point(0, 0, 1))
    val test = Vector(Point(0, 0, 1), Point(0, 0, 2)) // second is always missed
    assert(Knn.missRate(train, test, 3) == 0.5)
  }
}
