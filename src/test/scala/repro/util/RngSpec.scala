package repro.util

import org.scalatest.funsuite.AnyFunSuite

class RngSpec extends AnyFunSuite {

  test("hash is deterministic") {
    assert(Rng.hash(1L, 2L, 3L) == Rng.hash(1L, 2L, 3L))
  }

  test("hash differs across key order") {
    assert(Rng.hash(1L, 2L) != Rng.hash(2L, 1L))
  }

  test("hash differs across arity") {
    assert(Rng.hash(1L) != Rng.hash(1L, 0L))
  }

  test("mix is collision-free on a contiguous range") {
    val outs = (0L until 10000L).map(Rng.mix).toSet
    assert(outs.size == 10000)
  }

  test("unif is always in [0, 1)") {
    (0 until 5000).foreach { i =>
      val u = Rng.unif(Rng.hash(999L, i.toLong), i.toLong)
      assert(u >= 0.0 && u < 1.0)
    }
  }

  test("unif has roughly uniform mean") {
    val n = 20000
    val mean = (0 until n).map(i => Rng.unif(42L, i.toLong)).sum / n
    assert(math.abs(mean - 0.5) < 0.01, s"mean=$mean")
  }

  test("unif has roughly uniform variance") {
    val n = 20000
    val xs = (0 until n).map(i => Rng.unif(43L, i.toLong))
    val mean = xs.sum / n
    val v = xs.map(x => (x - mean) * (x - mean)).sum / n
    assert(math.abs(v - 1.0 / 12.0) < 0.005, s"var=$v")
  }

  test("gaussian has mean ~0 and variance ~1") {
    val n = 20000
    val xs = (0 until n).map(i => Rng.gaussian(44L, i.toLong))
    val mean = xs.sum / n
    val v = xs.map(x => (x - mean) * (x - mean)).sum / n
    assert(math.abs(mean) < 0.03, s"mean=$mean")
    assert(math.abs(v - 1.0) < 0.05, s"var=$v")
  }

  test("gaussian is deterministic") {
    assert(Rng.gaussian(7L, 8L) == Rng.gaussian(7L, 8L))
  }

  test("int respects bounds") {
    (0 until 2000).foreach { i =>
      val k = Rng.int(17, i.toLong)
      assert(k >= 0 && k < 17)
    }
  }

  test("int covers the whole range") {
    val seen = (0 until 2000).map(i => Rng.int(7, 5L, i.toLong)).toSet
    assert(seen == (0 until 7).toSet)
  }

  test("int rejects non-positive bound") {
    intercept[IllegalArgumentException](Rng.int(0, 1L))
  }

  test("Zipf ranks are within [1, n]") {
    val z = new Rng.Zipf(100, 1.1)
    (0 until 1000).foreach { i =>
      val r = z.rank(Rng.unif(9L, i.toLong))
      assert(r >= 1 && r <= 100)
    }
  }

  test("Zipf rank 1 is the most frequent") {
    val z = new Rng.Zipf(50, 1.0)
    val counts = (0 until 20000)
      .map(i => z.rank(Rng.unif(10L, i.toLong)))
      .groupBy(identity).view.mapValues(_.size).toMap
    assert(counts(1) == counts.values.max)
    assert(counts(1) > counts.getOrElse(50, 0) * 3)
  }

  test("Zipf with small alpha is near-uniform") {
    val z = new Rng.Zipf(50, 0.1)
    val counts = (0 until 50000)
      .map(i => z.rank(Rng.unif(11L, i.toLong)))
      .groupBy(identity).view.mapValues(_.size).toMap
    val mx = counts.values.max.toDouble
    val mn = counts.values.min.toDouble
    assert(mx / mn < 2.5, s"max/min=${mx / mn}")
  }

  test("Zipf rank at u close to 1 returns n") {
    val z = new Rng.Zipf(10, 1.2)
    assert(z.rank(0.9999999) == 10)
  }

  test("Zipf rank at u=0 returns 1") {
    val z = new Rng.Zipf(10, 1.2)
    assert(z.rank(0.0) == 1)
  }

  test("Zipf is serializable (broadcast-safe)") {
    val z = new Rng.Zipf(20, 1.1)
    val bos = new java.io.ByteArrayOutputStream()
    new java.io.ObjectOutputStream(bos).writeObject(z)
    val z2 = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[Rng.Zipf]
    (0 until 100).foreach(i => assert(z2.rank(i / 100.0) == z.rank(i / 100.0)))
  }
}
