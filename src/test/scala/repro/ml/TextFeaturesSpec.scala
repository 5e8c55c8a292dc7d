package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class TextFeaturesSpec extends AnyFunSuite {
  import TextFeatures._

  test("tokens lowercases and splits on non-alphanumerics") {
    assert(tokens("Canon EOS-5D, Mark II!").toSeq == Seq("canon", "eos", "5d", "mark", "ii"))
  }

  test("tokens of null is empty") { assert(tokens(null).isEmpty) }
  test("tokens of empty string is empty") { assert(tokens("").isEmpty) }

  test("charNGrams produces sliding windows") {
    assert(charNGrams("abcd", 3).toSeq == Seq("abc", "bcd"))
  }

  test("charNGrams of short string returns the string") {
    assert(charNGrams("ab", 3).toSeq == Seq("ab"))
  }

  test("charNGrams collapses whitespace") {
    assert(charNGrams("a   b", 3).toSeq == Seq("a b"))
  }

  test("bucket is stable and within range") {
    (0 until 100).foreach { i =>
      val b = bucket(s"term$i", 64)
      assert(b >= 0 && b < 64)
      assert(b == bucket(s"term$i", 64))
    }
  }

  test("hashed vector is L2-normalized with sorted indices") {
    val (idx, vals) = hashed(Array("a", "b", "c", "a"), 1 << 10)
    assert(idx.toSeq == idx.sorted.toSeq)
    assert(math.abs(vals.map(v => v * v).sum - 1.0) < 1e-9)
  }

  test("hashed of empty input is empty") {
    val (idx, vals) = hashed(Array.empty[String], 16)
    assert(idx.isEmpty && vals.isEmpty)
  }

  test("cosine of identical vectors is 1") {
    val (i, v) = hashed(Array("x", "y", "z"), 1 << 10)
    assert(math.abs(cosine(i, v, i, v) - 1.0) < 1e-9)
  }

  test("cosine of disjoint vectors is 0") {
    val (ia, va) = hashed(Array("aaa"), 1 << 12)
    val (ib, vb) = hashed(Array("zzz"), 1 << 12)
    assert(cosine(ia, va, ib, vb) == 0.0 || (ia sameElements ib)) // barring a hash collision
  }

  test("cosine is symmetric") {
    val (ia, va) = hashed(Array("a", "b"), 1 << 10)
    val (ib, vb) = hashed(Array("b", "c"), 1 << 10)
    assert(math.abs(cosine(ia, va, ib, vb) - cosine(ib, vb, ia, va)) < 1e-12)
  }

  test("pairVector of identical inputs has zero difference part") {
    val (i, v) = hashed(Array("a", "b"), 1 << 8)
    val (pi, pv) = pairVector(i, v, i, v, 1 << 8)
    // all indices should be in the min-part (>= dim), none in the |diff| part
    assert(pi.forall(_ >= (1 << 8)))
    assert(pv.forall(_ > 0))
  }

  test("pairVector of disjoint inputs has no min part") {
    val (ia, va) = hashed(Array("aaa"), 1 << 12)
    val (ib, vb) = hashed(Array("zzz"), 1 << 12)
    if (!(ia sameElements ib)) {
      val (pi, _) = pairVector(ia, va, ib, vb, 1 << 12)
      assert(pi.forall(_ < (1 << 12)))
    }
  }

  test("pairVector indices are sorted and within 2*dim") {
    val (ia, va) = hashed(Array("a", "b", "c"), 1 << 8)
    val (ib, vb) = hashed(Array("b", "c", "d"), 1 << 8)
    val (pi, _) = pairVector(ia, va, ib, vb, 1 << 8)
    assert(pi.toSeq == pi.sorted.toSeq)
    assert(pi.forall(i => i >= 0 && i < 2 * (1 << 8)))
  }
}
