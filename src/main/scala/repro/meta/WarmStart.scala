package repro.meta

import repro.core.Observation
import repro.space.{Config, ConfigSpace}
import repro.surrogate.{Gp, MixedKernel, Surrogate}
import repro.meta.TaskSimilarity.DistanceModel

/** A finished source task in the knowledge repository: meta-features, its
  * tuning history, and a surrogate fitted on that history. */
final case class SourceTask(name: String,
                            metaFeatures: Array[Double],
                            history: Vector[Observation],
                            surrogate: Surrogate)

object SourceTask {
  /** Fit a GP surrogate over a source task's history (log-objective). */
  def fromHistory(cs: ConfigSpace, name: String, metaFeatures: Array[Double],
                  history: Vector[Observation]): SourceTask = {
    val xs = history.map(o => cs.toUnit(o.config)).toArray
    val ys = history.map(o => math.log(o.objective.max(1e-9))).toArray
    val gp = Gp.fit(xs, ys, ls => MixedKernel.forSpace(cs, withDataSize = false,
      numLs = 0.5 * ls, catLs = ls, amplitude = 1.0))
    SourceTask(name, metaFeatures, history, gp)
  }
}

/** Warm-starting and meta-surrogate assembly (§5.2). */
object WarmStart {

  /** Rank source tasks by learned similarity to the target's meta-features
    * and return the `top` most similar. */
  def similarSources(model: DistanceModel, targetMeta: Array[Double],
                     sources: Seq[SourceTask], top: Int = 3): Seq[(SourceTask, Double)] =
    sources.map(s => (s, model.distance(targetMeta, s.metaFeatures)))
      .sortBy(_._2).take(top)

  /** Initial configurations for the target task: the best configuration
    * found in each of the top-3 most similar source tasks ("select the
    * best Spark configuration found in these top-3 tasks"). */
  def initialConfigs(model: DistanceModel, targetMeta: Array[Double],
                     sources: Seq[SourceTask], top: Int = 3): Vector[Config] =
    similarSources(model, targetMeta, sources, top).flatMap { case (s, _) =>
      val feas = s.history.filter(_.feasible)
      val pool = if (feas.nonEmpty) feas else s.history
      if (pool.isEmpty) None else Some(pool.minBy(_.objective).config)
    }.toVector

  /** Base surrogates + similarity weights wᵢ = 1 − Dist(Mⁱ, Mᵗ) for the
    * ensemble of Eq. 12 (normalization happens inside MetaEnsemble). */
  def ensembleBases(model: DistanceModel, targetMeta: Array[Double],
                    sources: Seq[SourceTask], top: Int = 3): Vector[(Surrogate, Double)] =
    similarSources(model, targetMeta, sources, top)
      .map { case (s, d) => (s.surrogate, 1.0 - d) }.toVector
}
