package repro.harness

import repro.SparkSpec
import repro.graph.GraphGen
import repro.prob.{Constant, UniformHash, WIC}

/** Smoke tests of the table harnesses at tiny scale: the same code paths
  * the benches run, minutes cheaper.
  */
class HarnessSpec extends SparkSpec {

  private val tinyWl = Seq(
    Workload("T1*", "tiny rmat", Workload.ScaleFree, () => GraphGen.rmat(256, 1500, seed = 801)),
    Workload("T2*", "tiny grid", Workload.Road, () => GraphGen.grid(12, 12)),
  )

  test("workload registry covers the paper's three graph classes") {
    assert(Workloads.all.size == 9)
    assert(Workloads.all.count(_.cls == Workload.ScaleFree) == 5)
    assert(Workloads.all.count(_.cls == Workload.Road) == 2)
    assert(Workloads.all.count(_.cls == Workload.Knn) == 2)
    assert(Workloads.appendix.forall(Workloads.all.contains))
  }

  test("probability assignments follow the paper's settings") {
    val sf = Workloads.all.find(_.cls == Workload.ScaleFree).get
    val rd = Workloads.all.find(_.cls == Workload.Road).get
    assert(sf.consistent == Constant(0.02) && rd.consistent == Constant(0.2))
    assert(sf.uniform == UniformHash(0.0, 0.1) && rd.uniform == UniformHash(0.1, 0.3))
    assert(sf.wic.isInstanceOf[WIC] && rd.wic.isInstanceOf[WIC])
  }

  test("table3 harness emits one coherent row per workload") {
    val rows = Tables.table3(spark, tinyWl, r = 16, k = 5, sims = 32)
    assert(rows.size == 2)
    rows.foreach { r =>
      assert(r.n == r.wl.graph.n && r.m == r.wl.graph.m)
      assert(r.influence >= 5.0 && r.influence <= r.n)
    }
    val s = Tables.formatTable3(rows)
    assert(s.contains("T1*") && s.contains("T2*"))
  }

  test("table4 harness runs all four systems and normalizes influence") {
    val rows = Tables.table4(spark, tinyWl, _.consistent, r = 16, k = 5, sims = 32)
    rows.foreach { row =>
      assert(row.systems.map(_.system) ==
        Seq("Ours_1", "Ours_0.1", "InfuserMG", "Ripples"))
      assert(row.relativeInfluence.max == 1.0)
      assert(row.relativeInfluence.forall(x => x > 0 && x <= 1.0))
      assert(row.systems.forall(_.memBytes > 0))
      // Ours/InfuserMG share sketches and selection semantics here, so
      // their influence must be identical at tiny scale.
      val inf = row.systems.map(_.influence)
      assert(inf(0) == inf(2), "Ours_1 vs InfuserMG influence")
      assert(inf(0) == inf(1), "Ours_1 vs Ours_0.1 influence (lossless compression)")
    }
    val s = Tables.formatTable4(rows)
    assert(s.contains("Ripples") && s.contains("geomean"))
  }

  test("table4 harness under the appendix probability models") {
    Seq[Workload => repro.prob.ProbModel](_.uniform, _.wic).foreach { m =>
      val rows = Tables.table4(spark, tinyWl.take(1), m, r = 16, k = 4, sims = 32)
      assert(rows.head.systems.size == 4)
      assert(rows.head.relativeInfluence.forall(_ > 0))
    }
  }

  test("table5 harness: P-tree within 2x CELF, identical sketches for all") {
    val rows = Tables.table5(tinyWl, r = 16, k = 6)
    rows.foreach { r =>
      assert(r.ptree <= 2 * r.celf, s"${r.wl.name}: ptree=${r.ptree} celf=${r.celf}")
      assert(r.celf >= 0 && r.wintree >= 0)
      assert(r.n == r.wl.graph.n)
    }
    val s = Tables.formatTable5(rows)
    assert(s.contains("CELF") && s.contains("Win-Tree"))
  }
}
