package repro.sample

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.GraphGen
import repro.prob.{Constant, UniformHash, WIC}

class ProbModelSpec extends AnyFunSuite {

  test("Constant returns p for every edge") {
    val m = Constant(0.37)
    assert(m.prob(1, 2) == 0.37 && m.prob(100, 5) == 0.37)
  }

  test("Constant rejects out-of-range p") {
    intercept[IllegalArgumentException](Constant(1.5))
    intercept[IllegalArgumentException](Constant(-0.1))
  }

  test("UniformHash is symmetric, in range, and varies per edge") {
    val m = UniformHash(0.1, 0.3)
    val ps = for (u <- 0 until 50; v <- u + 1 until 50) yield m.prob(u, v)
    assert(ps.forall(p => p >= 0.1 && p < 0.3))
    assert(ps.distinct.size > ps.size / 2)
    assert(m.prob(3, 9) == m.prob(9, 3))
  }

  test("UniformHash empirical mean is the interval midpoint") {
    val m = UniformHash(0.0, 0.1)
    val ps = for (u <- 0 until 200; v <- u + 1 until 200) yield m.prob(u, v)
    assert(math.abs(ps.sum / ps.size - 0.05) < 0.002)
  }

  test("WIC gives 2/(du+dv), capped at 1") {
    val g = GraphGen.star(5) // center degree 4, leaves degree 1
    val m = WIC.of(g)
    assert(math.abs(m.prob(0, 1) - 2.0 / 5) < 1e-12)
    assert(m.prob(1, 2) == 1.0) // two degree-1 vertices (not an edge, still defined)
  }

  test("WIC is symmetric") {
    val g = GraphGen.rmat(256, 1500, seed = 21)
    val m = WIC.of(g)
    g.edgeList.foreach { case (u, v) => assert(m.prob(u, v) == m.prob(v, u)) }
  }
}

class EdgeSamplerSpec extends AnyFunSuite {

  test("sampling is deterministic in (edge, sketch)") {
    val s = EdgeSampler.forSketches(Constant(0.5))
    (0 until 100).foreach { i =>
      assert(s.sample(i, i + 1, 3) == s.sample(i, i + 1, 3))
    }
  }

  test("sampling is symmetric in (u, v)") {
    val s = EdgeSampler.forSketches(Constant(0.5))
    for (u <- 0 until 40; v <- u + 1 until 40; r <- 0 until 3)
      assert(s.sample(u, v, r) == s.sample(v, u, r))
  }

  test("different sketches sample differently") {
    val s = EdgeSampler.forSketches(Constant(0.5))
    val a = (0 until 200).map(i => s.sample(i, i + 1, 0))
    val b = (0 until 200).map(i => s.sample(i, i + 1, 1))
    assert(a != b)
  }

  test("different salts (sketch vs eval vs RIS) are independent draws") {
    val m = Constant(0.5)
    val a = (0 until 300).map(i => EdgeSampler.forSketches(m).sample(i, i + 1, 0))
    val b = (0 until 300).map(i => EdgeSampler.forEval(m).sample(i, i + 1, 0))
    val c = (0 until 300).map(i => EdgeSampler.forRis(m).sample(i, i + 1, 0))
    assert(a != b && b != c && a != c)
  }

  test("empirical sampling rate matches p") {
    val s = EdgeSampler.forSketches(Constant(0.2))
    var hits = 0
    val trials = 50000
    var i = 0
    while (i < trials) { if (s.sample(i, i + 1, 7)) hits += 1; i += 1 }
    assert(math.abs(hits.toDouble / trials - 0.2) < 0.01, s"rate=${hits.toDouble / trials}")
  }

  test("empirical rate matches per-edge UniformHash probabilities") {
    val m = UniformHash(0.0, 1.0)
    val s = EdgeSampler.forSketches(m)
    // For a fixed edge, the rate over many sketches must approach p_e.
    (0 until 5).foreach { e =>
      val p = m.prob(e, e + 1)
      val rate = (0 until 20000).count(r => s.sample(e, e + 1, r)).toDouble / 20000
      assert(math.abs(rate - p) < 0.02, s"edge $e: p=$p rate=$rate")
    }
  }

  test("p=0 never samples; p=1 always samples") {
    val zero = EdgeSampler.forSketches(Constant(0.0))
    val one = EdgeSampler.forSketches(Constant(1.0))
    (0 until 1000).foreach { i =>
      assert(!zero.sample(i, i + 1, 0)) // P[hash == 0.0 exactly] ~ 2^-53
      assert(one.sample(i, i + 1, 0))
    }
  }
}
