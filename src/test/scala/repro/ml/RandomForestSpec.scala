package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class RandomForestSpec extends AnyFunSuite {

  private def sep(n: Int, seed: Long = 1): IndexedSeq[LabeledVector] = {
    val rng = new Random(seed)
    IndexedSeq.fill(n) {
      val x = rng.nextDouble(); val y = rng.nextDouble()
      LabeledVector(Array(x, y, rng.nextDouble()), if (x + y > 1.0) 1 else 0)
    }
  }

  test("forest has the requested number of trees") {
    assert(RandomForest.fit(sep(100), numTrees = 7).trees.size == 7)
  }

  test("forest classifies separable data accurately") {
    val d = sep(500)
    val f = RandomForest.fit(d, numTrees = 15)
    val acc = d.count(v => f.predict(v.features) == v.label).toDouble / d.size
    assert(acc > 0.95, s"accuracy $acc")
  }

  test("predictProb is the mean of tree probabilities") {
    val d = sep(200, seed = 2)
    val f = RandomForest.fit(d, numTrees = 5)
    val x = Array(0.7, 0.8, 0.1)
    val mean = f.trees.map(_.predictProb(x)).sum / 5
    assert(math.abs(f.predictProb(x) - mean) < 1e-12)
  }

  test("voteFraction is in [0,1] and consistent with hard votes") {
    val d = sep(200, seed = 3)
    val f = RandomForest.fit(d, numTrees = 9)
    val rng = new Random(4)
    (1 to 100).foreach { _ =>
      val x = Array(rng.nextDouble(), rng.nextDouble(), rng.nextDouble())
      val vf = f.voteFraction(x)
      assert(vf >= 0.0 && vf <= 1.0)
      assert(math.abs(vf * 9 - math.round(vf * 9)) < 1e-9) // multiple of 1/9
    }
  }

  test("fit is deterministic in the seed") {
    val d = sep(200, seed = 5)
    assert(RandomForest.fit(d, numTrees = 5, seed = 42) == RandomForest.fit(d, numTrees = 5, seed = 42))
  }

  test("different seeds give different forests (bagging variance)") {
    val d = sep(200, seed = 6)
    assert(RandomForest.fit(d, numTrees = 5, seed = 1) != RandomForest.fit(d, numTrees = 5, seed = 2))
  }

  test("single-class data predicts that class everywhere") {
    val d = IndexedSeq.fill(30)(LabeledVector(Array(0.2, 0.9), 1))
    val f = RandomForest.fit(d, numTrees = 3)
    assert(f.predict(Array(0.0, 0.0)) == 1)
    assert(f.predict(Array(1.0, 1.0)) == 1)
  }

  test("forest is serializable (broadcast requirement)") {
    val f = RandomForest.fit(sep(50), numTrees = 3)
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(f)
    val back = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[RandomForest]
    assert(back.predict(Array(0.9, 0.9, 0.5)) == f.predict(Array(0.9, 0.9, 0.5)))
  }

  test("empty training data is rejected") {
    assertThrows[IllegalArgumentException](RandomForest.fit(IndexedSeq.empty))
  }

  test("forest generalizes to unseen points of the same distribution") {
    val train = sep(400, seed = 8)
    val testD = sep(200, seed = 9)
    val f = RandomForest.fit(train, numTrees = 15)
    val acc = testD.count(v => f.predict(v.features) == v.label).toDouble / testD.size
    assert(acc > 0.9, s"test accuracy $acc")
  }
}
