package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{InfluenceEval, PaCIM}
import repro.graph.{CSRGraph, GraphGen}
import repro.prob.Constant

class RISSpec extends AnyFunSuite {

  test("returns k distinct in-range seeds and coherent accounting") {
    val g = GraphGen.rmat(512, 3000, seed = 81)
    val res = RIS.run(g, Constant(0.05), k = 10, pilot = 256)
    assert(res.seeds.length == 10 && res.seeds.distinct.length == 10)
    assert(res.seeds.forall(v => v >= 0 && v < g.n))
    assert(res.theta > 0 && res.theta <= res.requiredTheta)
    assert(res.rrBytes > 0)
    assert(res.capped == (res.theta < res.requiredTheta))
  }

  test("on p=1 components RIS picks one seed per component, biggest first") {
    // Components of sizes 6, 3, 1 with p=1: every RR set from a component
    // is the whole component; greedy coverage picks them biggest-first.
    val edges = Seq((0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (6, 7), (7, 8))
    val g = CSRGraph.fromEdges(10, edges)
    val res = RIS.run(g, Constant(1.0), k = 3, pilot = 64)
    val comp = res.seeds.map(v => if (v <= 5) 0 else if (v <= 8) 1 else 2)
    assert(comp.toSet.size == 3, s"seeds=${res.seeds.mkString(",")}")
    assert(comp(0) == 0 && comp(1) == 1 && comp(2) == 2)
  }

  test("theta grows when epsilon shrinks") {
    val g = GraphGen.rmat(256, 1500, seed = 82)
    val loose = RIS.run(g, Constant(0.05), 5, eps = 0.5, pilot = 256)
    val tight = RIS.run(g, Constant(0.05), 5, eps = 0.25, pilot = 256)
    assert(tight.requiredTheta > loose.requiredTheta)
  }

  test("memory cap binds and is reported") {
    val g = GraphGen.rmat(512, 3000, seed = 83)
    val res = RIS.run(g, Constant(0.05), 5, maxStoredInts = 20000, maxSets = 2000, pilot = 128)
    assert(res.capped)
    assert(res.theta < res.requiredTheta)
  }

  test("RIS quality is comparable to PaC-IM (within 10% on influence)") {
    val g = GraphGen.rmat(1024, 8000, seed = 84)
    val model = Constant(0.05)
    val ris = RIS.run(g, model, 10, pilot = 512)
    val ours = PaCIM.run(g, model, 10, 64, 1.0)
    val iRis = InfluenceEval.estimate(g, ris.seeds, model, 1000)
    val iOurs = InfluenceEval.estimate(g, ours.seeds, model, 1000)
    assert(iRis >= 0.9 * iOurs, s"ris=$iRis ours=$iOurs")
    assert(iOurs >= 0.9 * iRis, s"ris=$iRis ours=$iOurs")
  }

  test("greedy max coverage on a crafted instance") {
    // Star with p=1: all RR sets are the whole graph; first seed covers
    // everything, remaining seeds are arbitrary but distinct.
    val g = GraphGen.star(12)
    val res = RIS.run(g, Constant(1.0), 3, pilot = 64)
    assert(res.seeds.distinct.length == 3)
  }
}
