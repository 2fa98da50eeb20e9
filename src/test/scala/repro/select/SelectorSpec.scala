package repro.select

import org.scalatest.funsuite.AnyFunSuite
import repro.TestRefs
import repro.core.PaCIM
import repro.graph.{CSRGraph, GraphGen}
import repro.prob.{Constant, ProbModel, UniformHash}
import repro.sample.EdgeSampler
import repro.sketch.SketchBuilder

class SelectorSpec extends AnyFunSuite {

  private def selectors = Seq(
    new CelfSelector(parallelMarginal = false),
    new CelfSelector(parallelMarginal = true),
    new PTreeSelector(),
    new WinTreeSelector(),
    new WinTreeSelector(seqCutoffDepth = 0), // fully sequential recursion
  )

  private def cases: Seq[(String, CSRGraph, ProbModel, Int)] = Seq(
    ("er-dense", GraphGen.erdosRenyi(150, 500, seed = 51), Constant(0.3), 10),
    ("er-sparse", GraphGen.erdosRenyi(200, 250, seed = 52), Constant(0.5), 12),
    ("rmat", GraphGen.rmat(256, 1500, seed = 53), Constant(0.08), 15),
    ("grid", GraphGen.grid(15, 15), Constant(0.25), 10),
    ("knn", GraphGen.knn(250, 4, seed = 54), Constant(0.2), 10),
    ("uniform-p", GraphGen.rmat(200, 1000, seed = 55), UniformHash(0.0, 0.2), 8),
    ("path", GraphGen.path(100), Constant(0.9), 5),
    ("star", GraphGen.star(64), Constant(0.5), 4),
  )

  test("all selectors pick the seed set of brute-force greedy on sigma-hat") {
    cases.take(4).foreach { case (name, g, model, k) =>
      val numSk = 8
      val sampler = EdgeSampler.forSketches(model)
      val expect = TestRefs.bruteGreedy(g, sampler, numSk, k).toSeq
      val sk = SketchBuilder.build(g, model, numSk, alpha = 1.0)
      selectors.foreach { sel =>
        val got = PaCIM.selectOn(sk, k, sel).seeds.toSeq
        assert(got == expect, s"$name / ${sel.name}")
      }
    }
  }

  test("CELF, P-tree and Win-Tree select identical seeds on every case and alpha") {
    cases.foreach { case (name, g, model, k) =>
      Seq(0.0, 0.15, 1.0).foreach { alpha =>
        val sk = SketchBuilder.build(g, model, 12, alpha)
        val results = selectors.map(sel => PaCIM.selectOn(sk, k, sel).seeds.toSeq)
        results.tail.foreach(r => assert(r == results.head, s"$name alpha=$alpha"))
      }
    }
  }

  test("Thm 4.2: P-tree evaluations <= 2x CELF evaluations") {
    cases.foreach { case (name, g, model, k) =>
      val sk = SketchBuilder.build(g, model, 12, alpha = 1.0)
      val celf = PaCIM.selectOn(sk, k, new CelfSelector())
      val pt = PaCIM.selectOn(sk, k, new PTreeSelector())
      assert(pt.evaluations <= 2 * celf.evaluations,
        s"$name: ptree=${pt.evaluations} celf=${celf.evaluations}")
    }
  }

  test("CELF never evaluates more than P-tree's bound or n per round") {
    cases.foreach { case (name, g, model, k) =>
      val sk = SketchBuilder.build(g, model, 12, alpha = 1.0)
      val celf = PaCIM.selectOn(sk, k, new CelfSelector())
      assert(celf.evaluations <= g.n.toLong * k, name)
    }
  }

  test("seeds are distinct and within range") {
    cases.foreach { case (name, g, model, k) =>
      val sk = SketchBuilder.build(g, model, 12, alpha = 0.2)
      selectors.foreach { sel =>
        val seeds = PaCIM.selectOn(sk, k, sel).seeds
        assert(seeds.length == k, s"$name/${sel.name}")
        assert(seeds.distinct.length == k, s"$name/${sel.name} duplicates")
        assert(seeds.forall(v => v >= 0 && v < g.n), s"$name/${sel.name}")
      }
    }
  }

  test("greedy marginal gains are non-increasing (submodularity observed)") {
    val (_, g, model, _) = cases.head
    val numSk = 8
    val sampler = EdgeSampler.forSketches(model)
    val sk = SketchBuilder.build(g, model, numSk, 1.0)
    val seeds = PaCIM.selectOn(sk, 10, new CelfSelector()).seeds
    val gains = seeds.indices.map { i =>
      TestRefs.sketchSigma(g, sampler, numSk, seeds.take(i + 1).toSeq) -
        TestRefs.sketchSigma(g, sampler, numSk, seeds.take(i).toSeq)
    }
    gains.sliding(2).foreach { case Seq(a, b) => assert(b <= a + 1e-9); case _ => }
  }

  test("selecting k = n seeds takes every vertex") {
    val g = GraphGen.erdosRenyi(30, 60, seed = 56)
    val sk = SketchBuilder.build(g, Constant(0.3), 8, 1.0)
    selectors.foreach { sel =>
      val seeds = PaCIM.selectOn(sk, 30, sel).seeds
      assert(seeds.sorted.toSeq == (0 until 30))
    }
  }

  test("k = 1 returns the vertex with the highest initial score") {
    cases.foreach { case (name, g, model, _) =>
      val sk = SketchBuilder.build(g, model, 12, 1.0)
      val expect = (0 until g.n).maxBy(v => (sk.initScores(v), -v))
      selectors.foreach { sel =>
        assert(PaCIM.selectOn(sk, 1, sel).seeds.toSeq == Seq(expect), s"$name/${sel.name}")
      }
    }
  }

  test("on a disconnected clique pair, the two cliques' minima are chosen first (p=1)") {
    // Two cliques {0..9} and {10..24} with p=1: sigma-hat is exact; the
    // greedy picks one vertex of the big clique, then one of the small.
    val edges = (for { i <- 0 until 10; j <- i + 1 until 10 } yield (i, j)) ++
      (for { i <- 10 until 25; j <- i + 1 until 25 } yield (i, j))
    val g = CSRGraph.fromEdges(25, edges)
    val sk = SketchBuilder.build(g, Constant(1.0), 4, 1.0)
    selectors.foreach { sel =>
      val seeds = PaCIM.selectOn(sk, 2, sel).seeds.toSeq
      assert(seeds == Seq(10, 0), s"${sel.name} got $seeds")
    }
  }

  test("Win-Tree evaluation count is never below CELF's minimum need") {
    cases.take(4).foreach { case (name, g, model, k) =>
      val sk = SketchBuilder.build(g, model, 12, 1.0)
      val wt = PaCIM.selectOn(sk, k, new WinTreeSelector())
      // Sanity: it must at least have found k seeds.
      assert(wt.seeds.length == k, name)
      assert(wt.evaluations >= 0, name)
    }
  }
}
