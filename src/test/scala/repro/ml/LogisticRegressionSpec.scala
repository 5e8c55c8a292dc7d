package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LogisticRegressionSpec extends AnyFunSuite {

  /** Sparse two-feature problem: label = feature 0 present. */
  private def data(n: Int, seed: Long = 1): IndexedSeq[SparseExample] = {
    val rng = new Random(seed)
    IndexedSeq.fill(n) {
      if (rng.nextBoolean()) SparseExample(Array(0, 2), Array(1.0, rng.nextDouble()), 1)
      else SparseExample(Array(1, 2), Array(1.0, rng.nextDouble()), 0)
    }
  }

  test("learns a separable sparse problem") {
    val d = data(300)
    val m = LogisticRegression.fit(d, dim = 4, epochs = 10)
    val acc = d.count(ex => m.predict(ex.indices, ex.values) == ex.label).toDouble / d.size
    assert(acc > 0.98, s"accuracy $acc")
  }

  test("positive-indicator weight exceeds negative-indicator weight") {
    val m = LogisticRegression.fit(data(300), dim = 4, epochs = 10)
    assert(m.weights(0) > m.weights(1))
  }

  test("score is a probability in (0,1)") {
    val m = LogisticRegression.fit(data(100), dim = 4)
    val s = m.score(Array(0), Array(1.0))
    assert(s > 0.0 && s < 1.0)
  }

  test("deterministic in the seed") {
    val d = data(100, 3)
    val a = LogisticRegression.fit(d, 4, seed = 5)
    val b = LogisticRegression.fit(d, 4, seed = 5)
    assert(a.weights.sameElements(b.weights) && a.bias == b.bias)
  }

  test("more epochs move weights further (training actually iterates)") {
    val d = data(100, 4)
    val w1 = LogisticRegression.fit(d, 4, epochs = 1).weights(0)
    val w10 = LogisticRegression.fit(d, 4, epochs = 10).weights(0)
    assert(math.abs(w10) > math.abs(w1))
  }

  test("l2 regularization shrinks weights") {
    val d = data(200, 5)
    val wFree = LogisticRegression.fit(d, 4, epochs = 20, l2 = 0.0).weights(0)
    val wReg  = LogisticRegression.fit(d, 4, epochs = 20, l2 = 0.1).weights(0)
    assert(math.abs(wReg) < math.abs(wFree))
  }

  test("empty data is rejected") {
    assertThrows[IllegalArgumentException](LogisticRegression.fit(IndexedSeq.empty, 4))
  }

  test("model is serializable (broadcast requirement)") {
    val m = LogisticRegression.fit(data(50), 4)
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(m)
    val back = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[LogisticModel]
    assert(back.score(Array(0), Array(1.0)) == m.score(Array(0), Array(1.0)))
  }
}
