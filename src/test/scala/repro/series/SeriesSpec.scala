package repro.series

import org.scalatest.funsuite.AnyFunSuite

class SeriesSpec extends AnyFunSuite {

  private val rnd = new java.util.Random(99)
  private def randSeries(n: Int): Array[Double] = Array.fill(n)(rnd.nextGaussian() * 3 + 1)

  test("znormalize produces zero mean and unit variance") {
    (0 until 50).foreach { _ =>
      val z = Series.znormalize(randSeries(64))
      val mean = z.sum / z.length
      val varr = z.map(v => (v - mean) * (v - mean)).sum / z.length
      assert(math.abs(mean) < 1e-9)
      assert(math.abs(varr - 1.0) < 1e-9)
    }
  }
  test("znormalize of a constant series is all zeros") {
    assert(Series.znormalize(Array.fill(16)(7.3)).forall(_ == 0.0))
  }
  test("znormalize is idempotent") {
    val z = Series.znormalize(randSeries(32))
    val z2 = Series.znormalize(z)
    z.indices.foreach(i => assert(math.abs(z(i) - z2(i)) < 1e-9))
  }
  test("euclidean of identical series is zero") {
    val s = randSeries(32)
    assert(Series.euclidean(s, s) == 0.0)
  }
  test("euclidean is symmetric") {
    (0 until 20).foreach { _ =>
      val a = randSeries(32); val b = randSeries(32)
      assert(math.abs(Series.euclidean(a, b) - Series.euclidean(b, a)) < 1e-12)
    }
  }
  test("euclidean satisfies the triangle inequality") {
    (0 until 50).foreach { _ =>
      val a = randSeries(16); val b = randSeries(16); val c = randSeries(16)
      assert(Series.euclidean(a, c) <= Series.euclidean(a, b) + Series.euclidean(b, c) + 1e-9)
    }
  }
  test("euclidean rejects length mismatch") {
    intercept[IllegalArgumentException](Series.euclidean(randSeries(8), randSeries(16)))
  }
  test("squaredEuclideanAbandon equals full squared distance when under bound") {
    (0 until 30).foreach { _ =>
      val a = randSeries(32); val b = randSeries(32)
      val d = Series.euclidean(a, b)
      val d2 = Series.squaredEuclideanAbandon(a, b, d * d + 1)
      assert(math.abs(d2 - d * d) < 1e-9)
    }
  }
  test("squaredEuclideanAbandon exceeds bound when abandoning") {
    val a = randSeries(64); val b = randSeries(64)
    val d2 = Series.squaredEuclideanAbandon(a, b, 0.0001)
    assert(d2 > 0.0001)
  }
  test("paa of a constant series is constant") {
    val p = Series.paa(Array.fill(32)(2.5), 8)
    assert(p.length == 8)
    p.foreach(v => assert(math.abs(v - 2.5) < 1e-12))
  }
  test("paa with w = length is the identity") {
    val s = randSeries(16)
    val p = Series.paa(s, 16)
    s.indices.foreach(i => assert(math.abs(p(i) - s(i)) < 1e-12))
  }
  test("paa with w = 1 is the mean") {
    val s = randSeries(64)
    assert(math.abs(Series.paa(s, 1)(0) - s.sum / s.length) < 1e-9)
  }
  test("paa segment means are exact") {
    val s = Array[Double](1, 3, 5, 7, 2, 4, 6, 8)
    val p = Series.paa(s, 4)
    assert(p.sameElements(Array(2.0, 6.0, 3.0, 7.0)))
  }
  test("paa rejects non-dividing segment counts") {
    intercept[IllegalArgumentException](Series.paa(randSeries(10), 3))
  }
  test("paaLowerBound lower-bounds the true distance") {
    (0 until 200).foreach { _ =>
      val a = Series.znormalize(randSeries(32)); val b = Series.znormalize(randSeries(32))
      val lb = Series.paaLowerBound(Series.paa(a, 8), Series.paa(b, 8), 32)
      assert(lb <= Series.euclidean(a, b) + 1e-9)
    }
  }
  test("paaLowerBound is tight for segment-constant series") {
    val a = Array[Double](1, 1, 2, 2); val b = Array[Double](3, 3, 5, 5)
    val lb = Series.paaLowerBound(Series.paa(a, 2), Series.paa(b, 2), 4)
    assert(math.abs(lb - Series.euclidean(a, b)) < 1e-9)
  }
}
