package repro.core

import repro.graph.CSRGraph
import repro.prob.ProbModel
import repro.select.{Selector, SelectionResult, WinTreeSelector}
import repro.sketch.{SketchBuilder, SketchSet}

/** PaC-IM: Parallel and Compressed Influence Maximization (Alg. 1).
  *
  * Step 1 builds R compressed sketches in parallel
  * ([[repro.sketch.SketchBuilder]], Alg. 3); step 2 greedily selects k
  * seeds with a parallel-CELF structure (Win-Tree by default, as in the
  * paper; P-tree available).
  *
  * `Ours₁` in the tables = `alpha = 1` (no compression);
  * `Ours₀.₁` = `alpha = 0.1` (10× sketch compression).
  */
object PaCIM {

  /** Full run record: seeds plus everything the tables report. */
  final case class Result(
      seeds: Array[Int],
      evaluations: Long,
      sketchTimeMs: Long,
      selectTimeMs: Long,
      sketchBytes: Long,
      structBytes: Long,
      csrBytes: Long,
      bfsVisits: Long,
  ) {
    def totalTimeMs: Long = sketchTimeMs + selectTimeMs
    /** Total modeled footprint: input graph + sketches + selector. */
    def totalBytes: Long = csrBytes + sketchBytes + structBytes
  }

  def run(g: CSRGraph, model: ProbModel, k: Int, numSketches: Int = 256,
          alpha: Double = 1.0, selector: Selector = new WinTreeSelector(),
          ccAlgo: SketchBuilder.CCAlgo = SketchBuilder.CCAlgo.UnionFind): Result = {
    val t0 = System.nanoTime()
    val sk = SketchBuilder.build(g, model, numSketches, alpha, ccAlgo)
    val t1 = System.nanoTime()
    val sel = selector.select(sk, k)
    val t2 = System.nanoTime()
    Result(
      seeds = sel.seeds,
      evaluations = sel.evaluations,
      sketchTimeMs = (t1 - t0) / 1000000,
      selectTimeMs = (t2 - t1) / 1000000,
      sketchBytes = sk.sketchBytes + 8L * g.n, // + memoized init scores
      structBytes = sel.structBytes,
      csrBytes = g.csrBytes,
      bfsVisits = sk.visitCounter.sum(),
    )
  }

  /** Select seeds on an already-built sketch set (copies it first so the
    * caller can reuse the sketches across selectors — Tab. 5).
    */
  def selectOn(sk: SketchSet, k: Int, selector: Selector): SelectionResult =
    selector.select(sk.copy(), k)
}
