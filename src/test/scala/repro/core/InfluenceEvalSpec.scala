package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{CSRGraph, GraphGen}
import repro.prob.Constant
import repro.sample.EdgeSampler

class InfluenceEvalSpec extends AnyFunSuite {

  test("p=1: sigma is the size of the union of seed components") {
    val g = CSRGraph.fromEdges(10,
      Seq((0, 1), (1, 2), (3, 4), (5, 6), (6, 7), (7, 8)))
    val model = Constant(1.0)
    assert(InfluenceEval.estimate(g, Array(0), model, 10) == 3.0)
    assert(InfluenceEval.estimate(g, Array(3), model, 10) == 2.0)
    assert(InfluenceEval.estimate(g, Array(0, 5), model, 10) == 7.0)
    assert(InfluenceEval.estimate(g, Array(9), model, 10) == 1.0)
  }

  test("p=0: sigma equals the number of seeds") {
    val g = GraphGen.clique(20)
    assert(InfluenceEval.estimate(g, Array(1, 5, 9), Constant(0.0), 20) == 3.0)
  }

  test("single edge with probability p activates p of the time") {
    val g = CSRGraph.fromEdges(2, Seq((0, 1)))
    val est = InfluenceEval.estimate(g, Array(0), Constant(0.3), 20000)
    assert(math.abs(est - 1.3) < 0.02, s"est=$est")
  }

  test("two-hop path: sigma(1 + p + p^2)") {
    val g = GraphGen.path(3)
    val p = 0.5
    val est = InfluenceEval.estimate(g, Array(0), Constant(p), 40000)
    assert(math.abs(est - (1 + p + p * p)) < 0.02, s"est=$est")
  }

  test("simulate is deterministic per sim id") {
    val g = GraphGen.rmat(256, 1500, seed = 71)
    val sampler = EdgeSampler.forEval(Constant(0.1))
    val seeds = Array(1, 2, 3)
    (0 until 20).foreach { sim =>
      assert(InfluenceEval.simulate(g, seeds, sampler, sim) ==
        InfluenceEval.simulate(g, seeds, sampler, sim))
    }
  }

  test("monotonicity: adding a seed never lowers sigma") {
    val g = GraphGen.rmat(512, 3000, seed = 72)
    val model = Constant(0.05)
    val s1 = InfluenceEval.estimate(g, Array(1, 2), model, 500)
    val s2 = InfluenceEval.estimate(g, Array(1, 2, 3), model, 500)
    assert(s2 >= s1)
  }

  test("sigma is bounded by n and at least |seeds|") {
    val g = GraphGen.grid(20, 20)
    val est = InfluenceEval.estimate(g, Array(0, 100, 399), Constant(0.2), 200)
    assert(est >= 3.0 && est <= g.n)
  }
}
