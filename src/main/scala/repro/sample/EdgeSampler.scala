package repro.sample

import repro.prob.ProbModel
import repro.util.Rand

/** Deterministic ("fusion") edge sampling — Alg. 3, lines 8–10.
  *
  * Whether edge e = {u, v} is present in sampled graph r is a pure
  * function of (e, r): `hash01(edgeKey(u,v), salt(r)) <= p_e`. A sampled
  * graph is therefore never materialized; BFS over it re-hashes edges on
  * the fly, and any process (test, Spark executor, oracle) reconstructs
  * the identical graph from the sketch id r.
  *
  * `salt` decouples families of draws: sketches, Monte-Carlo influence
  * simulations, and RR-set sampling each use their own salt so they are
  * independent experiments.
  */
final class EdgeSampler(val model: ProbModel, val salt: Long) extends Serializable {

  @inline private def rSalt(r: Int): Long = Rand.mix2(salt, r.toLong)

  /** Is {u, v} present in sampled graph r? Symmetric in (u, v). */
  @inline def sample(u: Int, v: Int, r: Int): Boolean =
    Rand.hash01(Rand.edgeKey(u, v), rSalt(r)) <= model.prob(u, v)
}

object EdgeSampler {
  /** Salt for the R sketches (Alg. 1 step 1). */
  val SketchSalt = 0x51e7c4afL
  /** Salt for Monte-Carlo influence estimation (Tab. 3/4 "Influence"). */
  val EvalSalt = 0x0e7a1bbcL
  /** Salt for reverse-reachable sampling in the Ripples-style baseline. */
  val RisSalt = 0x7157a9d3L

  def forSketches(model: ProbModel) = new EdgeSampler(model, SketchSalt)
  def forEval(model: ProbModel) = new EdgeSampler(model, EvalSalt)
  def forRis(model: ProbModel) = new EdgeSampler(model, RisSalt)
}
