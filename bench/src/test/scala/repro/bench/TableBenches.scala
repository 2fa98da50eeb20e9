package repro.bench

import repro.SparkSpec
import repro.harness.{Tables, Workloads}

/** Benchmark suites, one per evaluation table. Each prints the
  * paper-style rows (captured into bench_output.txt and recorded against
  * the paper's numbers in EXPERIMENTS.md) and asserts the *shape*
  * properties the paper claims, so a regression in either performance
  * model or algorithm behavior fails the bench.
  *
  * Settings follow the paper: k = 100 seeds, R = 256 sketches,
  * Ripples at ε = 0.5. Influence uses 256 Monte-Carlo simulations,
  * distributed via Spark.
  */
class Table3Bench extends SparkSpec {
  test("Table 3: graph information and influence of 100 PaC-IM seeds") {
    val rows = Tables.table3(spark, Workloads.all)
    println("==== Table 3 (graph information; paper Tab. 3) ====")
    println(Tables.formatTable3(rows))
    rows.foreach { r =>
      assert(r.influence >= 100.0, s"${r.wl.name}: influence below seed count")
      assert(r.influence <= r.n, s"${r.wl.name}: influence above n")
    }
    // Paper shape: scale-free graphs at p=0.02 spread far beyond the
    // seeds; road graphs at p=0.2 stay near the seed count (GER: 384 of
    // 12.3M; USA: 370 of 23.9M).
    val road = rows.filter(_.wl.cls == repro.harness.Workload.Road)
    road.foreach(r => assert(r.influence < 0.02 * r.n,
      s"${r.wl.name}: road influence should be tiny, got ${r.influence}"))
  }
}

class Table4Bench extends SparkSpec {
  test("Table 4: time, memory, influence of all systems (Consistent p)") {
    val rows = Tables.table4(spark, Workloads.all, _.consistent)
    println("==== Table 4 (main comparison; paper Tab. 4) ====")
    println(Tables.formatTable4(rows))
    rows.foreach { row =>
      val Seq(ours1, ours01, infuser, ripples) = row.systems
      val rel = row.relativeInfluence
      // Quality: PaC-IM is never worse than the baselines (paper: 100%).
      assert(rel.head >= 0.97, s"${row.wl.name}: Ours_1 relative influence ${rel.head}")
      // Lossless compression: identical seeds => identical influence.
      assert(ours1.influence == ours01.influence, row.wl.name)
      // Space shape: Ours_0.1 beats the forward-sketch systems everywhere;
      // vs Ripples the paper's "smallest on all graphs" holds on
      // scale-free graphs. At laptop scale Ripples' θ on road/k-NN graphs
      // is small enough that its RR storage undercuts even compressed
      // sketches — a scale artifact recorded in EXPERIMENTS.md.
      assert(ours01.memBytes <= ours1.memBytes, row.wl.name)
      assert(ours01.memBytes <= infuser.memBytes, row.wl.name)
      if (row.wl.cls == repro.harness.Workload.ScaleFree)
        assert(ours01.memBytes <= ripples.memBytes, row.wl.name)
      // Sketch-compression factor on the auxiliary data is ~10x by model.
      assert(ours1.memBytes < infuser.memBytes * 1.05, row.wl.name)
    }
  }
}

class Table5Bench extends SparkSpec {
  test("Table 5: re-evaluation counts of CELF vs P-tree vs Win-Tree") {
    val rows = Tables.table5(Workloads.all)
    println("==== Table 5 (#re-evaluations; paper Tab. 5) ====")
    println(Tables.formatTable5(rows))
    rows.foreach { r =>
      assert(r.ptree <= 2 * r.celf, s"${r.wl.name}: Thm 4.2 violated")
      assert(r.ptree >= r.celf, s"${r.wl.name}: P-tree below CELF")
    }
    // Paper shape: on scale-free graphs nearly every vertex is
    // re-evaluated (counts ~ n); on road graphs counts are orders of
    // magnitude below n.
    rows.filter(_.wl.cls == repro.harness.Workload.ScaleFree).foreach { r =>
      assert(r.celf > r.n / 4, s"${r.wl.name}: expected ~n evals, got ${r.celf} of n=${r.n}")
    }
    rows.filter(_.wl.cls == repro.harness.Workload.Road).foreach { r =>
      assert(r.celf < r.n / 10, s"${r.wl.name}: expected few evals, got ${r.celf} of n=${r.n}")
    }
  }
}

class Table6Bench extends SparkSpec {
  test("Table 6 (appendix): all systems under Uniform edge probabilities") {
    val rows = Tables.table4(spark, Workloads.appendix, _.uniform)
    println("==== Table 6 (Uniform U(0,0.1)/U(0.1,0.3); paper Tab. 6) ====")
    println(Tables.formatTable4(rows))
    rows.foreach { row =>
      assert(row.relativeInfluence.head >= 0.97, row.wl.name)
      assert(row.systems(1).memBytes <= row.systems.map(_.memBytes).max, row.wl.name)
    }
  }
}

class Table7Bench extends SparkSpec {
  test("Table 7 (appendix): all systems under WIC edge probabilities") {
    val rows = Tables.table4(spark, Workloads.appendix, _.wic)
    println("==== Table 7 (WIC p=2/(du+dv); paper Tab. 7) ====")
    println(Tables.formatTable4(rows))
    rows.foreach { row =>
      assert(row.relativeInfluence.head >= 0.95, row.wl.name)
      // Under WIC the sampled graphs are so sparse that Ripples' RR sets
      // are tiny at our scale (the paper's appendix notes the same 10x
      // memory drop for Ripples under WIC); the min-memory claim is only
      // asserted against the forward-sketch systems here.
      val Seq(ours1, ours01, infuser, _) = row.systems
      assert(ours01.memBytes <= ours1.memBytes, row.wl.name)
      assert(ours01.memBytes <= infuser.memBytes, row.wl.name)
    }
  }
}

/** Fig.-8-style compression sweep (the paper's α tradeoff study) — kept
  * as a bench because it validates Thm 3.1's time/space tradeoff even
  * though figures are out of scope.
  */
class CompressionSweepBench extends SparkSpec {
  test("alpha sweep: space shrinks monotonically, seeds stay identical") {
    import repro.core.PaCIM
    val wl = Workloads.EP
    val alphas = Seq(1.0, 0.5, 0.2, 0.1, 0.05)
    val runs = alphas.map(a => a -> PaCIM.run(wl.graph, wl.consistent, 100, 256, a))
    println("==== Compression sweep (paper Fig. 8, EP analog) ====")
    println(f"${"alpha"}%8s${"sketch(s)"}%12s${"select(s)"}%12s${"sketch MB"}%12s${"visits/eval"}%14s")
    runs.foreach { case (a, r) =>
      println(f"$a%8.2f${r.sketchTimeMs / 1000.0}%12.2f${r.selectTimeMs / 1000.0}%12.2f" +
        f"${r.sketchBytes / 1048576.0}%12.1f${r.bfsVisits.toDouble / math.max(1, r.evaluations * 256)}%14.2f")
    }
    val seeds = runs.map(_._2.seeds.toSeq)
    seeds.tail.foreach(s => assert(s == seeds.head, "compression must be lossless"))
    val bytes = runs.map(_._2.sketchBytes)
    bytes.sliding(2).foreach { case Seq(hi, lo) => assert(lo < hi); case _ => }
  }
}
