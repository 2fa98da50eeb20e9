package repro.baseline

import java.util.concurrent.atomic.LongAdder

import repro.graph.CSRGraph
import repro.prob.ProbModel
import repro.sample.EdgeSampler
import repro.util.{Par, Rand, Scratch}

/** Ripples-style baseline [56, 57]: Reverse Influence Sampling.
  *
  * On an undirected graph under IC, the reverse-reachable (RR) set of a
  * uniformly random target t on a sampled graph is exactly t's connected
  * component there; k seeds are then a greedy maximum coverage of the RR
  * sets. θ follows the TIM/IMM recipe the Ripples family uses:
  * θ = λ(ε) / OPT̂ with λ(ε) = (8+2ε)·n·(ln n + ln C(n,k) + ln 2)/ε² and
  * OPT̂ a lower bound estimated from a pilot batch (KPT-style).
  *
  * The paper runs Ripples at ε = 0.5 (fastest setting, quality ≥ 93%).
  * Substitution note (DESIGN.md): RR storage is capped at `maxStoredInts`
  * (the paper's machine has 1.5TB; ours doesn't) — when the cap binds,
  * `cappedTheta < requiredTheta` is reported so the table can show it,
  * mirroring how Ripples runs out of memory/time on the larger graphs.
  */
object RIS {

  final case class Result(
      seeds: Array[Int],
      theta: Long,
      requiredTheta: Long,
      rrBytes: Long,
      genTimeMs: Long,
      coverTimeMs: Long,
      capped: Boolean,
  ) {
    def totalTimeMs: Long = genTimeMs + coverTimeMs
  }

  /** One RR set: the component of a random target on sampled graph `idx`. */
  private def rrSet(g: CSRGraph, sampler: EdgeSampler, idx: Int): Array[Int] = {
    val t = ((Rand.mix2(0x7a26e7L, idx.toLong) >>> 1) % g.n).toInt
    val s = Scratch.local(g.n)
    s.reset()
    s.visit(t)
    s.queue(0) = t
    var head = 0; var tail = 1
    while (head < tail) {
      val u = s.queue(head); head += 1
      g.foreachNeighbor(u) { w =>
        if (!s.visited(w) && sampler.sample(u, w, idx)) {
          s.visit(w); s.queue(tail) = w; tail += 1
        }
      }
    }
    java.util.Arrays.copyOf(s.queue, tail)
  }

  /** ln C(n, k). */
  private def lnChoose(n: Long, k: Int): Double = {
    var s = 0.0
    var i = 0
    while (i < k) { s += math.log((n - i).toDouble / (i + 1)); i += 1 }
    s
  }

  /** Greedy max coverage (lazy/CELF-accelerated) of the RR sets. */
  private def maxCover(n: Int, sets: Array[Array[Int]], k: Int): Array[Int] = {
    // Inverted index: vertex -> RR-set ids containing it.
    val deg = new Array[Int](n)
    sets.foreach(_.foreach(v => deg(v) += 1))
    val off = new Array[Int](n + 1)
    var v = 0
    while (v < n) { off(v + 1) = off(v) + deg(v); v += 1 }
    val inv = new Array[Int](off(n))
    val cur = off.clone()
    var si = 0
    while (si < sets.length) {
      sets(si).foreach { u => inv(cur(u)) = si; cur(u) += 1 }
      si += 1
    }
    val counts = deg.clone()
    val covered = new Array[Boolean](sets.length)
    // Lazy greedy with IMMUTABLE queue entries (count, id) snapshotted at
    // insert time: coverage counts only decrease, so a popped entry whose
    // snapshot is stale is re-inserted with its current count (CELF-style).
    // Entries must be immutable — ordering by the live counts array would
    // silently corrupt the heap as counts change under it.
    val ord = new Ordering[(Int, Int)] {
      override def compare(a: (Int, Int), b: (Int, Int)): Int = {
        val c = java.lang.Integer.compare(a._1, b._1)
        if (c != 0) c else java.lang.Integer.compare(b._2, a._2) // smaller id wins
      }
    }
    val pq = new scala.collection.mutable.PriorityQueue[(Int, Int)]()(ord)
    v = 0
    while (v < n) { pq.enqueue((counts(v), v)); v += 1 }
    val seeds = new Array[Int](math.min(k, n))
    val taken = new Array[Boolean](n)
    var s = 0
    while (s < seeds.length) {
      var chosen = -1
      while (chosen < 0) {
        val (snap, top) = pq.dequeue()
        if (taken(top)) () // skip: already a seed (never happens; safety)
        else if (counts(top) == snap) chosen = top
        else pq.enqueue((counts(top), top))
      }
      seeds(s) = chosen
      taken(chosen) = true
      var i = off(chosen)
      while (i < off(chosen + 1)) {
        val set = inv(i)
        if (!covered(set)) {
          covered(set) = true
          sets(set).foreach(u => counts(u) -= 1)
        }
        i += 1
      }
      s += 1
    }
    seeds
  }

  def run(g: CSRGraph, model: ProbModel, k: Int, eps: Double = 0.5,
          maxStoredInts: Long = 50000000L, maxSets: Long = 4000000L,
          pilot: Int = 1024): Result = {
    val sampler = EdgeSampler.forRis(model)
    val n = g.n
    val t0 = System.nanoTime()

    // --- Pilot: estimate an OPT lower bound from a small batch. ---
    val pilotSets = Par.parTabulate(pilot)(i => rrSet(g, sampler, Int.MaxValue - i))
    val pilotSeeds = maxCover(n, pilotSets, k)
    val pilotCoverSet = new Array[Boolean](pilot)
    pilotSeeds.foreach { sv =>
      var i = 0
      while (i < pilot) {
        if (!pilotCoverSet(i) && pilotSets(i).contains(sv)) pilotCoverSet(i) = true
        i += 1
      }
    }
    val frac = pilotCoverSet.count(identity).toDouble / pilot
    val optHat = math.max(k.toDouble, frac * n / (1.0 + eps))

    // --- θ from the IMM bound, capped by the storage budget. ---
    val lambda = (8 + 2 * eps) * n * (math.log(n) + lnChoose(n, k) + math.log(2)) / (eps * eps)
    val requiredTheta = math.ceil(lambda / optHat).toLong
    // Estimate per-set size from the pilot to honor the int budget.
    val meanSize = math.max(1.0, pilotSets.iterator.map(_.length.toLong).sum.toDouble / pilot)
    val affordable =
      math.max(pilot.toLong, math.min(maxSets, (maxStoredInts / meanSize).toLong))
    val theta = math.min(requiredTheta, affordable)
    val capped = theta < requiredTheta

    // --- Generate θ RR sets and greedily cover. ---
    val stored = new LongAdder
    val sets = Par.parTabulate(theta.toInt) { i =>
      val rr = rrSet(g, sampler, i)
      stored.add(rr.length.toLong)
      rr
    }
    val t1 = System.nanoTime()
    val seeds = maxCover(n, sets, k)
    val t2 = System.nanoTime()

    Result(
      seeds = seeds,
      theta = theta,
      requiredTheta = requiredTheta,
      // RR sets + inverted index, 4 bytes per entry each.
      rrBytes = 8L * stored.sum(),
      genTimeMs = (t1 - t0) / 1000000,
      coverTimeMs = (t2 - t1) / 1000000,
      capped = capped,
    )
  }
}
