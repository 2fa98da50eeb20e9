package repro.util

import org.scalatest.funsuite.AnyFunSuite

class RandSpec extends AnyFunSuite {

  test("mix64 is deterministic") {
    assert(Rand.mix64(12345L) == Rand.mix64(12345L))
  }

  test("mix64 spreads nearby keys") {
    val a = Rand.mix64(1L); val b = Rand.mix64(2L)
    assert(a != b)
    assert(java.lang.Long.bitCount(a ^ b) > 10)
  }

  test("hash01 lies in [0, 1)") {
    val rng = new Rand.Pcg(1)
    (1 to 10000).foreach { _ =>
      val x = Rand.hash01(rng.nextLong())
      assert(x >= 0.0 && x < 1.0)
    }
  }

  test("hash01 two-arg differs from one-arg") {
    assert(Rand.hash01(7L, 9L) != Rand.hash01(7L))
  }

  test("hash01 is approximately uniform") {
    val n = 100000
    val mean = (0 until n).map(i => Rand.hash01(i.toLong)).sum / n
    assert(math.abs(mean - 0.5) < 0.01, s"mean=$mean")
    val buckets = new Array[Int](10)
    (0 until n).foreach(i => buckets((Rand.hash01(i.toLong) * 10).toInt) += 1)
    buckets.foreach(b => assert(math.abs(b - n / 10) < n / 50))
  }

  test("edgeKey is symmetric and injective on canonical pairs") {
    val rng = new Rand.Pcg(2)
    (1 to 5000).foreach { _ =>
      val u = rng.nextInt(100000); val v = rng.nextInt(100000)
      assert(Rand.edgeKey(u, v) == Rand.edgeKey(v, u))
    }
    assert(Rand.edgeKey(1, 2) != Rand.edgeKey(1, 3))
    assert(Rand.edgeKey(1, 2) != Rand.edgeKey(2, 3))
  }

  test("Pcg is deterministic per seed") {
    val a = new Rand.Pcg(5); val b = new Rand.Pcg(5)
    assert((1 to 100).map(_ => a.nextLong()) == (1 to 100).map(_ => b.nextLong()))
  }

  test("Pcg nextInt respects bounds") {
    val r = new Rand.Pcg(6)
    (1 to 1000).foreach { _ =>
      val x = r.nextInt(17)
      assert(x >= 0 && x < 17)
    }
  }

  test("Pcg nextGaussian has roughly unit variance") {
    val r = new Rand.Pcg(8)
    val xs = (1 to 20000).map(_ => r.nextGaussian())
    val mean = xs.sum / xs.size
    val varc = xs.map(x => (x - mean) * (x - mean)).sum / xs.size
    assert(math.abs(mean) < 0.05)
    assert(math.abs(varc - 1.0) < 0.1)
  }
}

class ParSpec extends AnyFunSuite {

  test("parFor covers every index exactly once") {
    val hits = new java.util.concurrent.atomic.AtomicIntegerArray(10000)
    Par.parFor(10000)(i => hits.incrementAndGet(i))
    (0 until 10000).foreach(i => assert(hits.get(i) == 1))
  }

  test("parTabulate matches sequential tabulate") {
    assert(Par.parTabulate(5000)(i => i * i).toSeq == (0 until 5000).map(i => i * i))
  }

  test("parSumD sums doubles") {
    assert(math.abs(Par.parSumD(1000)(i => i * 0.5) - 0.5 * 999 * 1000 / 2) < 1e-6)
  }

  test("parSumL sums longs") {
    assert(Par.parSumL(1000)(i => i.toLong) == 999L * 1000 / 2)
  }

  test("parFor with zero iterations is a no-op") {
    Par.parFor(0)(_ => fail("body must not run"))
  }

  test("Scratch visit/reset semantics") {
    val s = new Scratch(10)
    s.reset()
    assert(!s.visited(3))
    s.visit(3)
    assert(s.visited(3))
    s.reset()
    assert(!s.visited(3))
  }

  test("Scratch.local is per-thread and per-size") {
    val a = Scratch.local(100)
    val b = Scratch.local(100)
    val c = Scratch.local(200)
    assert(a eq b)
    assert(!(a eq c))
    var other: Scratch = null
    val t = new Thread(() => { other = Scratch.local(100) })
    t.start(); t.join()
    assert(!(a eq other))
  }
}
