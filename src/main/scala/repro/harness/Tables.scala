package repro.harness

import org.apache.spark.sql.SparkSession

import repro.baseline.{InfuserMG, RIS}
import repro.core.{InfluenceEval, PaCIM}
import repro.prob.ProbModel
import repro.select.{CelfSelector, PTreeSelector, WinTreeSelector}
import repro.sketch.SketchBuilder

/** Harnesses that produce the rows of the paper's evaluation tables.
  * One function per table; benches print them, jobs wrap them for
  * spark-submit, EXPERIMENTS.md records them against the paper's values.
  */
object Tables {

  val DefaultR = 256
  val DefaultK = 100
  val DefaultSims = 256

  // ---------------------------------------------------------------- Table 3

  final case class Table3Row(wl: Workload, n: Int, m: Long, influence: Double)

  /** Tab. 3: graph sizes + influence of 100 seeds selected by PaC-IM,
    * measured by Spark-distributed Monte-Carlo simulation.
    */
  def table3(spark: SparkSession, wls: Seq[Workload], r: Int = DefaultR,
             k: Int = DefaultK, sims: Int = DefaultSims): Seq[Table3Row] =
    wls.map { wl =>
      val g = wl.graph
      val res = PaCIM.run(g, wl.consistent, k, r, alpha = 1.0)
      val inf = InfluenceEval.sparkEstimate(spark, g, res.seeds, wl.consistent, sims)
      Table3Row(wl, g.n, g.m, inf)
    }

  def formatTable3(rows: Seq[Table3Row]): String = {
    val sb = new StringBuilder
    sb ++= f"${"graph"}%-7s${"paper analog"}%-22s${"class"}%-12s${"|V|"}%10s${"|E|"}%12s${"influence"}%12s\n"
    rows.foreach { t =>
      sb ++= f"${t.wl.name}%-7s${t.wl.paperAnalog}%-22s${t.wl.cls.label}%-12s${t.n}%10d${t.m}%12d${t.influence}%12.1f\n"
    }
    sb.result()
  }

  // ------------------------------------------------------------ Tables 4/6/7

  final case class SystemRow(
      system: String,
      influence: Double,
      timeMs: Long,
      memBytes: Long,
      note: String = "",
  )

  final case class Table4Row(wl: Workload, csrBytes: Long, systems: Seq[SystemRow]) {
    def relativeInfluence: Seq[Double] = {
      val best = systems.map(_.influence).max
      systems.map(_.influence / best)
    }
  }

  /** Tab. 4 (and 6/7 with other `model`s): relative influence, total
    * running time, and memory of Ours₁, Ours₀.₁, InfuserMG, Ripples.
    */
  def table4(spark: SparkSession, wls: Seq[Workload], model: Workload => ProbModel,
             r: Int = DefaultR, k: Int = DefaultK, sims: Int = DefaultSims,
             risEps: Double = 0.5): Seq[Table4Row] =
    wls.map { wl =>
      val g = wl.graph
      val pm = model(wl)
      def inf(seeds: Array[Int]): Double =
        InfluenceEval.sparkEstimate(spark, g, seeds, pm, sims)

      val ours1 = PaCIM.run(g, pm, k, r, alpha = 1.0)
      val ours01 = PaCIM.run(g, pm, k, r, alpha = 0.1)
      val infuser = InfuserMG.run(g, pm, k, r)
      val ripples = RIS.run(g, pm, k, eps = risEps)

      Table4Row(wl, g.csrBytes, Seq(
        SystemRow("Ours_1", inf(ours1.seeds), ours1.totalTimeMs, ours1.totalBytes),
        SystemRow("Ours_0.1", inf(ours01.seeds), ours01.totalTimeMs, ours01.totalBytes),
        SystemRow("InfuserMG", inf(infuser.seeds), infuser.totalTimeMs, infuser.totalBytes),
        SystemRow("Ripples", inf(ripples.seeds), ripples.totalTimeMs,
          g.csrBytes + ripples.rrBytes,
          note = if (ripples.capped) s"theta=${ripples.theta} capped (needs ${ripples.requiredTheta})"
                 else s"theta=${ripples.theta}"),
      ))
    }

  def formatTable4(rows: Seq[Table4Row]): String = {
    val sb = new StringBuilder
    sb ++= f"${"graph"}%-7s${"system"}%-11s${"rel.inf"}%9s${"time(s)"}%10s${"mem(MB)"}%10s${"CSR(MB)"}%10s  note\n"
    rows.foreach { row =>
      val rel = row.relativeInfluence
      row.systems.zip(rel).foreach { case (s, ri) =>
        sb ++= f"${row.wl.name}%-7s${s.system}%-11s${ri * 100}%8.1f%%${s.timeMs / 1000.0}%10.2f${s.memBytes / 1048576.0}%10.1f${row.csrBytes / 1048576.0}%10.1f  ${s.note}\n"
      }
    }
    // Geometric means of time and memory relative to Ours_1 (Fig.-1 style).
    def geomean(xs: Seq[Double]): Double = math.exp(xs.map(math.log).sum / xs.size)
    val systems = rows.head.systems.map(_.system)
    sb ++= "relative to Ours_1 (geomean): "
    systems.zipWithIndex.foreach { case (name, i) =>
      val relT = geomean(rows.map(r => (r.systems(i).timeMs + 1).toDouble / (r.systems.head.timeMs + 1)))
      val relM = geomean(rows.map(r => r.systems(i).memBytes.toDouble / r.systems.head.memBytes))
      sb ++= f"$name time=${relT}%.2fx mem=${relM}%.2fx; "
    }
    sb ++= "\n"
    sb.result()
  }

  // ---------------------------------------------------------------- Table 5

  final case class Table5Row(wl: Workload, n: Int, celf: Long, ptree: Long, wintree: Long)

  /** Tab. 5: number of marginal-gain re-evaluations per selector on
    * identical sketches (α = 1, R sketches, k seeds).
    */
  def table5(wls: Seq[Workload], r: Int = DefaultR, k: Int = DefaultK): Seq[Table5Row] =
    wls.map { wl =>
      val g = wl.graph
      val sk = SketchBuilder.build(g, wl.consistent, r, alpha = 1.0)
      val celf = PaCIM.selectOn(sk, k, new CelfSelector())
      val pt = PaCIM.selectOn(sk, k, new PTreeSelector())
      val wt = PaCIM.selectOn(sk, k, new WinTreeSelector())
      Table5Row(wl, g.n, celf.evaluations, pt.evaluations, wt.evaluations)
    }

  def formatTable5(rows: Seq[Table5Row]): String = {
    val sb = new StringBuilder
    sb ++= f"${"graph"}%-7s${"n"}%10s${"CELF"}%12s${"P-tree"}%12s${"Win-Tree"}%12s\n"
    rows.foreach { t =>
      sb ++= f"${t.wl.name}%-7s${t.n}%10d${t.celf}%12d${t.ptree}%12d${t.wintree}%12d\n"
    }
    sb.result()
  }
}
