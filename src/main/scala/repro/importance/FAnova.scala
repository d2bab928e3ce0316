package repro.importance

import scala.util.Random
import repro.model.RandomForest
import repro.space.ConfigSpace

/** Functional ANOVA parameter importance (§4.1, after Hutter et al. [35]).
  *
  * A random forest is fit on the tuning history (unit-encoded configs →
  * objective); importance of parameter i is the fraction of total predictive
  * variance explained by its marginal:
  *
  *   V_i = Var_v( E_x[ f(x | x_i = v) ] ),   imp_i = V_i / V_total.
  *
  * Marginals are estimated by Monte-Carlo marginalization (grid over the
  * parameter × MC background samples) rather than exact tree marginals;
  * at ≤30 dims and small histories this is accurate and linear-time.
  * Pairwise interaction importance uses the same construction on value
  * pairs with the two single effects subtracted.
  */
object FAnova {

  final case class Result(single: Vector[Double], pairs: Map[(Int, Int), Double]) {
    /** Parameter indices ranked by single importance, descending. */
    def ranking: Vector[Int] = single.zipWithIndex.sortBy(-_._1).map(_._2)
  }

  private def gridFor(cs: ConfigSpace, i: Int, nGrid: Int): Array[Double] =
    if (cs.isCat(i)) Array.tabulate(cs.cardinality(i))(c => (c + 0.5) / cs.cardinality(i))
    else Array.tabulate(nGrid)(g => (g + 0.5) / nGrid)

  /** Compute importances from history (configs, objective values).
    *
    * @param nMc    background Monte-Carlo samples
    * @param nGrid  grid resolution per numeric parameter
    * @param topPairs evaluate pairwise terms only among this many top
    *                 single-importance parameters (0 disables pairs)
    */
  def importance(cs: ConfigSpace,
                 configs: Seq[repro.space.Config], ys: Seq[Double],
                 nMc: Int = 200, nGrid: Int = 8, topPairs: Int = 0,
                 seed: Long = 0L): Result = {
    require(configs.size == ys.size && configs.nonEmpty, "empty history")
    val xs = configs.map(cs.toUnit).toArray
    val rf = RandomForest.fit(xs, ys.toArray, nTrees = 24, maxDepth = 8, seed = seed)
    val rng = new Random(seed)
    val bg = Array.fill(nMc)(Array.fill(cs.dim)(rng.nextDouble()))

    val preds = bg.map(rf.predict)
    val mu = preds.sum / preds.length
    val totalVar = preds.map(p => (p - mu) * (p - mu)).sum / preds.length
    if (totalVar <= 1e-12)
      return Result(Vector.fill(cs.dim)(0.0), Map.empty)

    def marginalMean(fixed: Seq[(Int, Double)]): Double = {
      var s = 0.0
      var b = 0
      while (b < bg.length) {
        val x = bg(b).clone()
        fixed.foreach { case (d, v) => x(d) = v }
        s += rf.predict(x)
        b += 1
      }
      s / bg.length
    }

    val singleVar = Vector.tabulate(cs.dim) { i =>
      val grid = gridFor(cs, i, nGrid)
      val ms = grid.map(v => marginalMean(Seq(i -> v)))
      val m = ms.sum / ms.length
      ms.map(x => (x - m) * (x - m)).sum / ms.length
    }
    val single = singleVar.map(_ / totalVar)

    val pairs: Map[(Int, Int), Double] =
      if (topPairs <= 1) Map.empty
      else {
        val top = single.zipWithIndex.sortBy(-_._1).take(topPairs).map(_._2)
        (for {
          ai <- top.indices; bi <- (ai + 1) until top.size
          i = math.min(top(ai), top(bi)); j = math.max(top(ai), top(bi))
        } yield {
          val gi = gridFor(cs, i, nGrid / 2 max 2)
          val gj = gridFor(cs, j, nGrid / 2 max 2)
          val mi = gi.map(v => marginalMean(Seq(i -> v)))
          val mj = gj.map(v => marginalMean(Seq(j -> v)))
          val miBar = mi.sum / mi.length
          val mjBar = mj.sum / mj.length
          var v2 = 0.0
          for (a <- gi.indices; b <- gj.indices) {
            val joint = marginalMean(Seq(i -> gi(a), j -> gj(b)))
            val inter = joint - (mi(a) - miBar) - (mj(b) - mjBar) - mu
            v2 += (inter - mu) * (inter - mu)
          }
          // Interaction variance beyond the additive parts.
          (i, j) -> (v2 / (gi.length * gj.length) / totalVar)
        }).toMap
      }

    Result(single, pairs)
  }

  /** Average single-importance scores across tasks (§4.1: "obtain the final
    * importance scores by averaging the scores from those tasks"); returns
    * per-parameter (mean, std). */
  def aggregate(results: Seq[Result]): Vector[(Double, Double)] = {
    require(results.nonEmpty, "no results")
    val dim = results.head.single.size
    Vector.tabulate(dim) { i =>
      val vs = results.map(_.single(i))
      val m = vs.sum / vs.size
      val sd = math.sqrt(vs.map(v => (v - m) * (v - m)).sum / vs.size)
      (m, sd)
    }
  }
}
