package repro.connectivity

import org.scalatest.funsuite.AnyFunSuite
import repro.TestRefs
import repro.graph.GraphGen
import repro.prob.Constant
import repro.sample.EdgeSampler

class UnionFindSpec extends AnyFunSuite {

  test("singletons before any union") {
    val uf = new UnionFind(5)
    assert(uf.componentCount == 5)
    (0 until 5).foreach(v => assert(uf.find(v) == v && uf.componentSize(v) == 1))
  }

  test("union merges and is idempotent") {
    val uf = new UnionFind(4)
    assert(uf.union(0, 1))
    assert(!uf.union(1, 0))
    assert(uf.sameSet(0, 1) && !uf.sameSet(0, 2))
    assert(uf.componentSize(0) == 2 && uf.componentCount == 3)
  }

  test("transitive connectivity") {
    val uf = new UnionFind(6)
    uf.union(0, 1); uf.union(1, 2); uf.union(3, 4)
    assert(uf.sameSet(0, 2))
    assert(!uf.sameSet(2, 3))
    assert(uf.componentSize(4) == 2)
    assert(uf.componentCount == 3)
  }

  test("labels are the component minimum") {
    val uf = new UnionFind(6)
    uf.union(5, 3); uf.union(3, 1); uf.union(0, 4)
    val l = uf.labels
    assert(l(5) == 1 && l(3) == 1 && l(1) == 1)
    assert(l(0) == 0 && l(4) == 0)
    assert(l(2) == 2)
  }

  test("random graphs: UF labels == BFS labels") {
    (0 until 10).foreach { s =>
      val g = GraphGen.erdosRenyi(300, 200 + 50 * s, seed = 100 + s)
      assert(LocalCC.byUnionFind(g).toSeq == TestRefs.bfsCC(g).toSeq, s"seed $s")
    }
  }
}

class LocalCCSpec extends AnyFunSuite {

  test("coloring == union-find on full graphs") {
    (0 until 8).foreach { s =>
      val g = GraphGen.erdosRenyi(250, 300, seed = 200 + s)
      assert(LocalCC.byColoring(g).toSeq == LocalCC.byUnionFind(g).toSeq, s"seed $s")
    }
  }

  test("coloring == union-find on a high-diameter path") {
    val g = GraphGen.path(500)
    assert(LocalCC.byColoring(g).toSeq == LocalCC.byUnionFind(g).toSeq)
    assert(LocalCC.byUnionFind(g).forall(_ == 0))
  }

  test("sampled CC matches BFS on the same sampled graph") {
    val g = GraphGen.erdosRenyi(300, 900, seed = 300)
    val sampler = EdgeSampler.forSketches(Constant(0.4))
    (0 until 6).foreach { r =>
      val uf = LocalCC.byUnionFind(g, sampler, r)
      val col = LocalCC.byColoring(g, sampler, r)
      val bfs = TestRefs.bfsCC(g, sampler, r)
      assert(uf.toSeq == bfs.toSeq, s"UF sketch $r")
      assert(col.toSeq == bfs.toSeq, s"coloring sketch $r")
    }
  }

  test("different sketch ids sample different graphs") {
    val g = GraphGen.erdosRenyi(200, 800, seed = 301)
    val sampler = EdgeSampler.forSketches(Constant(0.3))
    val a = LocalCC.byUnionFind(g, sampler, 0)
    val b = LocalCC.byUnionFind(g, sampler, 1)
    assert(a.toSeq != b.toSeq)
  }

  test("p=1 sampling keeps the whole graph; p=0 isolates everything") {
    val g = GraphGen.grid(10, 10)
    val all = LocalCC.byUnionFind(g, EdgeSampler.forSketches(Constant(1.0)), 0)
    assert(all.forall(_ == 0))
    val none = LocalCC.byUnionFind(g, EdgeSampler.forSketches(Constant(0.0)), 0)
    assert(none.toSeq == (0 until 100))
  }

  test("sizesOf counts component members at the canonical label") {
    val labels = Array(0, 0, 2, 0, 2, 5)
    val s = LocalCC.sizesOf(labels)
    assert(s(0) == 3 && s(2) == 2 && s(5) == 1)
    assert(s(1) == 0 && s(3) == 0 && s(4) == 0)
  }
}
