package repro.sketch

import org.scalatest.funsuite.AnyFunSuite
import repro.TestRefs
import repro.graph.GraphGen
import repro.prob.{Constant, UniformHash}
import repro.sample.EdgeSampler

class SketchSetSpec extends AnyFunSuite {

  private val alphas = Seq(0.0, 0.1, 0.5, 1.0)

  test("chooseCenters: bounds, determinism, uniqueness, sortedness") {
    val c = SketchBuilder.chooseCenters(1000, 0.1)
    assert(c.length == 100)
    assert(c.toSeq == c.sorted.toSeq)
    assert(c.distinct.length == c.length)
    assert(c.forall(v => v >= 0 && v < 1000))
    assert(SketchBuilder.chooseCenters(1000, 0.1).toSeq == c.toSeq)
    assert(SketchBuilder.chooseCenters(1000, 0.0).isEmpty)
    assert(SketchBuilder.chooseCenters(1000, 1.0).toSeq == (0 until 1000))
  }

  test("alpha=1 sketch stores every component size at its representative") {
    val g = GraphGen.erdosRenyi(200, 300, seed = 31)
    val model = Constant(0.5)
    val sk = SketchBuilder.build(g, model, numSketches = 4, alpha = 1.0)
    val sampler = EdgeSampler.forSketches(model)
    (0 until 4).foreach { r =>
      val cc = TestRefs.bfsCC(g, sampler, r)
      val sizes = cc.groupBy(identity).view.mapValues(_.length).toMap
      (0 until g.n).foreach { v =>
        // With alpha=1 center index == vertex id; the label is the CC min.
        assert(sk.labels(r)(v) == cc(v), s"label of $v on sketch $r")
        if (cc(v) == v) assert(sk.sizes(r)(v) == sizes(v), s"size at rep $v sketch $r")
      }
    }
  }

  test("initScores equal the average component size") {
    val g = GraphGen.erdosRenyi(150, 250, seed = 32)
    val model = Constant(0.4)
    val numSk = 8
    val sampler = EdgeSampler.forSketches(model)
    alphas.foreach { a =>
      val sk = SketchBuilder.build(g, model, numSk, a)
      (0 until g.n).foreach { v =>
        val expect = TestRefs.sketchSigma(g, sampler, numSk, Seq(v))
        assert(math.abs(sk.initScores(v) - expect) < 1e-9, s"alpha=$a v=$v")
      }
    }
  }

  test("marginal on the empty seed set equals initScores for every alpha") {
    val g = GraphGen.rmat(256, 1200, seed = 33)
    val model = Constant(0.1)
    alphas.foreach { a =>
      val sk = SketchBuilder.build(g, model, 16, a)
      (0 until g.n by 7).foreach { v =>
        assert(math.abs(sk.marginal(v) - sk.initScores(v)) < 1e-9, s"alpha=$a v=$v")
      }
    }
  }

  test("marginal values are IDENTICAL across alphas after seeding (compression changes cost, not values)") {
    val g = GraphGen.rmat(256, 1200, seed = 34)
    val model = Constant(0.1)
    val sks = alphas.map(a => SketchBuilder.build(g, model, 16, a))
    val seedsToMark = Seq(3, 77, 145)
    seedsToMark.foreach(s => sks.foreach(_.markSeed(s)))
    (0 until g.n by 5).filterNot(seedsToMark.contains).foreach { v =>
      val vals = sks.map(_.marginal(v))
      assert(vals.forall(x => math.abs(x - vals.head) < 1e-9), s"v=$v vals=$vals")
    }
  }

  test("marginal equals the brute-force marginal gain of sigma-hat") {
    val g = GraphGen.erdosRenyi(120, 260, seed = 35)
    val model = Constant(0.3)
    val numSk = 8
    val sampler = EdgeSampler.forSketches(model)
    val sk = SketchBuilder.build(g, model, numSk, alpha = 0.2)
    val seeds = Seq(5, 40)
    seeds.foreach(sk.markSeed)
    val base = TestRefs.sketchSigma(g, sampler, numSk, seeds)
    (0 until g.n by 3).filterNot(seeds.contains).foreach { v =>
      val expect = TestRefs.sketchSigma(g, sampler, numSk, seeds :+ v) - base
      assert(math.abs(sk.marginal(v) - expect) < 1e-9, s"v=$v")
    }
  }

  test("marginal of a seed is zero") {
    val g = GraphGen.erdosRenyi(100, 200, seed = 36)
    val sk = SketchBuilder.build(g, Constant(0.3), 8, 0.3)
    sk.markSeed(17)
    assert(sk.marginal(17) == 0.0)
    assert(sk.seeded(17))
  }

  test("sequential and parallel marginal agree") {
    val g = GraphGen.rmat(512, 2500, seed = 37)
    val sk = SketchBuilder.build(g, Constant(0.05), 32, 0.1)
    sk.markSeed(9)
    (0 until g.n by 17).foreach { v =>
      assert(sk.marginal(v, parallel = false) == sk.marginal(v, parallel = true))
    }
  }

  test("copy isolates seed markings") {
    val g = GraphGen.erdosRenyi(100, 300, seed = 38)
    val sk = SketchBuilder.build(g, Constant(0.4), 8, 1.0)
    val before = sk.marginal(50)
    val c = sk.copy()
    c.markSeed(50)
    assert(c.marginal(50) == 0.0)
    assert(sk.marginal(50) == before, "original sketches must be untouched")
  }

  test("UF-built and coloring-built sketches are identical") {
    val g = GraphGen.rmat(300, 1500, seed = 39)
    val model = UniformHash(0.0, 0.3)
    val a = SketchBuilder.build(g, model, 8, 0.2, SketchBuilder.CCAlgo.UnionFind)
    val b = SketchBuilder.build(g, model, 8, 0.2, SketchBuilder.CCAlgo.Coloring)
    (0 until 8).foreach { r =>
      assert(a.labels(r).toSeq == b.labels(r).toSeq)
      assert(a.sizes(r).toSeq == b.sizes(r).toSeq)
    }
    assert(a.initScores.toSeq == b.initScores.toSeq)
  }

  test("sketchBytes follows the O((1+alpha R)n) model") {
    val g = GraphGen.erdosRenyi(1000, 3000, seed = 40)
    val r = 16
    val skFull = SketchBuilder.build(g, Constant(0.2), r, 1.0)
    val skComp = SketchBuilder.build(g, Constant(0.2), r, 0.1)
    assert(skFull.sketchBytes == 8L * r * 1000 + 4L * 1000)
    assert(skComp.sketchBytes == 8L * r * 100 + 4L * 1000)
  }

  test("Thm 3.1: expected BFS visits per evaluation bounded by ~min(1/alpha, T)") {
    val g = GraphGen.rmat(2048, 20000, seed = 41)
    val model = Constant(0.05)
    val numSk = 16
    val alpha = 0.1
    val sk = SketchBuilder.build(g, model, numSk, alpha)
    sk.visitCounter.reset()
    val evalVerts = (0 until g.n by 11).toArray
    evalVerts.foreach(v => sk.marginal(v))
    val visitsPerGetCenter = sk.visitCounter.sum().toDouble / (evalVerts.length.toLong * numSk)
    // Expected stopping time is 1/alpha = 10; allow generous slack for the
    // geometric tail and for small components.
    assert(visitsPerGetCenter < 3.0 / alpha, s"visits/GetCenter=$visitsPerGetCenter")
  }

  test("alpha=1 evaluations visit exactly one vertex per sketch") {
    val g = GraphGen.erdosRenyi(500, 1500, seed = 42)
    val sk = SketchBuilder.build(g, Constant(0.2), 8, 1.0)
    sk.visitCounter.reset()
    sk.marginal(123)
    assert(sk.visitCounter.sum() == 8)
  }

  test("markSeed zeroes exactly the component's representative size") {
    val g = GraphGen.path(10) // one CC when p=1
    val sk = SketchBuilder.build(g, Constant(1.0), 2, 1.0)
    assert(sk.sizes(0)(0) == 10)
    sk.markSeed(5)
    (0 until 2).foreach { r =>
      assert(sk.sizes(r)(0) == 0)
      (0 until 10).foreach(v => assert(sk.marginal(v) == 0.0))
    }
  }
}
