package repro.select

import org.scalatest.funsuite.AnyFunSuite
import repro.core.PaCIM
import repro.graph.GraphGen
import repro.prob.Constant
import repro.sketch.SketchBuilder

/** Win-Tree–specific behavior beyond the cross-selector equivalence in
  * SelectorSpec: determinism under asynchrony, degenerate shapes, and
  * non-power-of-two population sizes (padding leaves).
  */
class WinTreeSpec extends AnyFunSuite {

  test("selected seeds are identical across repeated concurrent runs") {
    val g = GraphGen.rmat(700, 4000, seed = 71) // 700: not a power of two
    val sk = SketchBuilder.build(g, Constant(0.08), 16, 1.0)
    val runs = (1 to 5).map(_ => PaCIM.selectOn(sk, 15, new WinTreeSelector()).seeds.toSeq)
    runs.tail.foreach(r => assert(r == runs.head))
  }

  test("parallel and sequential traversal select the same seeds") {
    val g = GraphGen.erdosRenyi(333, 800, seed = 72)
    val sk = SketchBuilder.build(g, Constant(0.3), 12, 0.2)
    val par = PaCIM.selectOn(sk, 12, new WinTreeSelector()).seeds.toSeq
    val seq = PaCIM.selectOn(sk, 12, new WinTreeSelector(seqCutoffDepth = 0)).seeds.toSeq
    assert(par == seq)
  }

  test("n = 1 graph") {
    val g = GraphGen.empty(1)
    val sk = SketchBuilder.build(g, Constant(0.5), 4, 1.0)
    val r = PaCIM.selectOn(sk, 1, new WinTreeSelector())
    assert(r.seeds.toSeq == Seq(0))
  }

  test("k larger than n is truncated to n") {
    val g = GraphGen.path(7)
    val sk = SketchBuilder.build(g, Constant(0.5), 4, 1.0)
    Seq(new WinTreeSelector(): Selector, new PTreeSelector(), new CelfSelector()).foreach { sel =>
      val r = PaCIM.selectOn(sk, 99, sel)
      assert(r.seeds.sorted.toSeq == (0 until 7), sel.name)
    }
  }

  test("all-isolated graph: seeds are the smallest ids (score ties)") {
    val g = GraphGen.empty(10)
    val sk = SketchBuilder.build(g, Constant(0.5), 4, 1.0)
    Seq(new WinTreeSelector(): Selector, new PTreeSelector(), new CelfSelector()).foreach { sel =>
      assert(PaCIM.selectOn(sk, 3, sel).seeds.toSeq == Seq(0, 1, 2), sel.name)
    }
  }

  test("structure bytes follow the 2n-ids model") {
    val g = GraphGen.erdosRenyi(1000, 2000, seed = 73)
    val sk = SketchBuilder.build(g, Constant(0.2), 4, 1.0)
    val r = PaCIM.selectOn(sk, 2, new WinTreeSelector())
    // 1024 leaves -> 2047 node ids (4B) + n stale doubles (8B).
    assert(r.structBytes == 4L * 2047 + 8L * 1000)
  }
}
