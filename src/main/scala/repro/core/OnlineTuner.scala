package repro.core

import scala.util.Random
import repro.bo.{Acquisition, Agd, SafeRegion, Subspace}
import repro.env.SparkClusterSim
import repro.meta.TaskSimilarity
import repro.space.{Config, ConfigSpace, SparkParams}
import repro.surrogate.{Gp, MetaEnsemble, MixedKernel, Pred, Surrogate}

/** Feature switches + hyper-parameters of the tuning framework.
  *
  * Defaults are the paper's (§4: τ_succ=3, τ_fail=5, K_min=4, K_init=10,
  * N_AGD=5, η=0.001; §4.2: γ; §3.3: low-discrepancy init, EI-based stop).
  * Baselines and ablations are expressed by flipping the `use*` flags.
  */
final case class TunerSettings(
    nInit: Int = 3,
    nCandidates: Int = 400,
    useSafety: Boolean = true,
    useEic: Boolean = true,          // constraint-weighted acquisition (Eq. 6)
    useSubspace: Boolean = true,
    useAgd: Boolean = true,
    useDataSize: Boolean = true,
    gamma: Double = 0.7,
    nAgd: Int = 5,
    agdEta: Double = 0.001,
    kInit: Int = 10, kMin: Int = 4, tauSucc: Int = 3, tauFail: Int = 5,
    stopEi: Double = 0.0,            // >0 enables the §3.3 stopping criterion
    seed: Long = 0L)

/** Outcome of a tuning session. */
final case class TuneOutcome(history: RunHistory, stoppedAt: Option[Int])

/** The OnlineTune controller (§3.1): orchestrates the per-execution tuning
  * loop against a (simulated) data platform.
  *
  * Each call to the platform = one periodic production run of the job; no
  * offline evaluations happen anywhere (the online paradigm, C.2).
  *
  * Surrogates are fit on log-runtime / log-objective: both are positive
  * with multiplicative noise, and the 10%-EI stopping rule of §3.3 becomes
  * a clean absolute threshold in log space.
  */
final class OnlineTuner(sim: SparkClusterSim,
                        objective: Objective,
                        settings: TunerSettings = TunerSettings(),
                        warmStart: Vector[Config] = Vector.empty,
                        metaBases: Vector[(Surrogate, Double)] = Vector.empty) {

  private val cs: ConfigSpace = sim.cs
  private val rng = new Random(settings.seed)
  private val safeRegion = new SafeRegion(settings.gamma)

  /** Unit-encode a config, appending the normalized data size when the
    * datasize-aware surrogate is enabled (§3.3 Dynamic Workload Support). */
  private def encode(c: Config, dsGB: Double): Array[Double] = {
    val u = cs.toUnit(c)
    if (settings.useDataSize) u :+ (dsGB / (2.0 * sim.spec.inputGB)).min(1.0).max(0.0)
    else u
  }

  private def kernelOf(ls: Double) =
    MixedKernel.forSpace(cs, withDataSize = settings.useDataSize,
      numLs = 0.5 * ls, catLs = ls, dsLs = 0.5 * ls)

  private def fitGp(xs: Array[Array[Double]], ys: Array[Double]): Gp =
    Gp.fit(xs, ys, kernelOf, noise = 1e-3)

  /** Cross-validation weight of the current-task surrogate in the Eq. 12
    * ensemble [25]: mean held-out rank agreement, floored for cold start. */
  private def currentTaskWeight(xs: Array[Array[Double]], ys: Array[Double]): Double = {
    if (xs.length < 6) return 0.3
    val folds = 3
    val taus = (0 until folds).flatMap { f =>
      val hold = xs.indices.filter(_ % folds == f)
      val train = xs.indices.filterNot(_ % folds == f)
      if (hold.size < 2 || train.size < 2) None
      else {
        val gp = fitGp(train.map(xs).toArray, train.map(ys).toArray)
        val pred = hold.map(i => gp.predict(xs(i)).mean)
        val act = hold.map(ys)
        Some(TaskSimilarity.kendallTau(pred, act))
      }
    }
    if (taus.isEmpty) 0.3 else (((taus.sum / taus.size) + 1.0) / 2.0).max(0.1)
  }

  /** Run the online tuning session for `budget` production executions.
    *
    * @param startIter index of the first production run (data-size drift
    *                  phase); lets callers model pre-tuning manual runs.
    */
  def tune(budget: Int, startIter: Int = 0): TuneOutcome = {
    val history = new RunHistory
    val subspace = new Subspace(cs, SparkParams.ExpertRanking,
      kInit = settings.kInit, kMin = settings.kMin,
      tauSucc = settings.tauSucc, tauFail = settings.tauFail)
    val agd = new Agd(cs, objective.beta, sim.resource, eta = settings.agdEta)
    val initConfigs: Vector[Config] = {
      val lds = cs.sampleLowDiscrepancy(settings.nInit, settings.seed)
      (warmStart ++ lds).take(settings.nInit.max(warmStart.size))
    }
    var stoppedAt: Option[Int] = None

    var it = 0
    while (it < budget && stoppedAt.isEmpty) {
      val globalIter = startIter + it
      val nextDs = sim.spec.dataSizeAt(globalIter)
      val config: Config =
        if (it < initConfigs.size) initConfigs(it)
        else suggest(history, subspace, agd, nextDs, it) match {
          case Right(c) => c
          case Left(maxEi) => // stopping criterion fired
            stoppedAt = Some(it)
            history.best.map(_.config).getOrElse(initConfigs.head)
        }
      if (stoppedAt.isEmpty) {
        val result = sim.run(config, globalIter)
        val y = objective.value(result)
        val improved = y < history.bestObjective && objective.feasible(result)
        history.add(Observation(config, result, y, objective.feasible(result), globalIter))
        // AGD iterations are not sub-space proposals — the TuRBO-style
        // streak counters only track the BO acquisitions (§4.1).
        val wasAgd = settings.useAgd && (history.size % settings.nAgd == 0)
        if (!wasAgd && it >= initConfigs.size) subspace.observe(improved)
        subspace.maybeRefit(history.all.map(_.config),
          history.all.map(o => math.log(o.objective.max(1e-9))), settings.seed + it)
      }
      it += 1
    }
    TuneOutcome(history, stoppedAt)
  }

  /** Algorithm 2: one configuration suggestion. Returns Left(maxEI) when
    * the stopping criterion fires (§3.3). */
  private def suggest(history: RunHistory, subspace: Subspace, agd: Agd,
                      nextDs: Double, it: Int): Either[Double, Config] = {
    val obs = history.all
    val xs = obs.map(o => encode(o.config, o.result.dataSizeGB)).toArray
    val yObj = obs.map(o => math.log(o.objective.max(1e-9))).toArray
    val yRt = obs.map(o => math.log(o.result.runtimeSec.max(1e-9))).toArray

    val gpObjLocal = fitGp(xs, yObj)
    val gpRt = fitGp(xs, yRt)
    val objSurrogate: Surrogate =
      if (metaBases.isEmpty) gpObjLocal
      else {
        val wCur = currentTaskWeight(xs, yObj)
        new MetaEnsemble((metaBases.map(_._1) :+ gpObjLocal),
                         (metaBases.map(_._2) :+ wCur))
      }

    val best = history.best.getOrElse(obs.minBy(_.objective))
    val yBestLog = math.log(best.objective.max(1e-9))
    val dsExtra = if (settings.useDataSize)
      Array((nextDs / (2.0 * sim.spec.inputGB)).min(1.0).max(0.0)) else Array.empty[Double]

    // --- AGD branch (every N_AGD iterations; Algorithm 2 lines 2–4) -----
    if (settings.useAgd && (obs.size + 1) % settings.nAgd == 0) {
      val rtForAgd = new Surrogate { // expose runtime on the natural scale
        def predict(x: Array[Double]): Pred = {
          val p = gpRt.predict(x)
          Pred(math.exp(p.mean), p.variance)
        }
      }
      return Right(cs.clip(agd.step(best.config, rtForAgd, dsExtra)))
    }

    // --- BO branch: sub-space ∩ safe region, EIC argmax (lines 6–8) ----
    // Non-subspace dims are pinned to an anchor; using the top-3 configs
    // (not just the incumbent) as anchors avoids locking a pathological
    // pinned value in place for the rest of the session.
    val anchors: Vector[Config] = {
      val feas = obs.filter(_.feasible)
      val pool = if (feas.nonEmpty) feas else obs
      pool.sortBy(_.objective).map(_.config).distinct.take(3)
    }
    def anchorAt(i: Int): Config = anchors(i % anchors.size)
    val free: Set[Int] =
      if (settings.useSubspace) subspace.freeDims else (0 until cs.dim).toSet
    val candidates: Vector[Config] = {
      // TuRBO-style mixture inside the sub-space: uniform coverage of the
      // free dims plus local moves around the incumbents, with a small
      // global-restart stream.
      val nSub = (settings.nCandidates * 0.4).toInt
      val nLoc = (settings.nCandidates * 0.5).toInt
      val nGlob = settings.nCandidates - nSub - nLoc
      Vector.tabulate(nSub)(i => cs.sampleInSubspace(anchorAt(i), free, rng)) ++
        Vector.tabulate(nLoc)(i => cs.perturbInSubspace(anchorAt(i), free, rng, sigma = 0.15)) ++
        Vector.fill(nGlob)(cs.sampleRandom(rng))
    }

    val scored = candidates.map { c =>
      val x = encode(c, nextDs)
      val pObj = objSurrogate.predict(x)
      val pRt = gpRt.predict(x)
      val res = sim.resource(c) // white-box resource (§4.3)
      (c, pObj, pRt, res)
    }

    // Resource constraint is analytic; runtime constraint via safe region.
    val resourceOk = scored.filter(_._4 <= objective.rMax)
    val pool0 = if (resourceOk.nonEmpty) resourceOk else scored
    val pool =
      if (!settings.useSafety || objective.tMax.isPosInfinity) pool0
      else {
        val safe = pool0.filter { case (_, _, pRt, _) =>
          safeRegion.isSafe(Seq((pRt, math.log(objective.tMax))))
        }
        if (safe.nonEmpty) safe
        else {
          // Cold start / empty safe set: expand conservatively from the
          // incumbent instead of free-ranging — keep only the quartile
          // with the lowest runtime upper bound (SafeOpt-style, [69]).
          val ranked = pool0.sortBy { case (_, _, pRt, _) => safeRegion.upperBound(pRt) }
          ranked.take((ranked.size / 4).max(1))
        }
      }

    val withEic = pool.map { case (c, pObj, pRt, _) =>
      val pr = if (!settings.useEic || objective.tMax.isPosInfinity) 1.0
               else Acquisition.prFeasible(pRt, math.log(objective.tMax))
      (c, pr * Acquisition.ei(pObj, yBestLog))
    }
    val (bestCand, maxEic) = withEic.maxBy(_._2)
    if (settings.stopEi > 0 && obs.size > settings.nInit && maxEic < settings.stopEi)
      Left(maxEic)
    else Right(bestCand)
  }

  /** §3.3 restarting criterion: continuous degradation — the incumbent's
    * recent actual results exceed the expected (historical incumbent)
    * objective by `tol` for `window` consecutive runs. */
  def degradationDetected(history: RunHistory, window: Int = 3, tol: Double = 0.3): Boolean = {
    val obs = history.all
    if (obs.size < window + 1) return false
    val recent = obs.takeRight(window)
    val expected = obs.dropRight(window).map(_.objective).min
    recent.forall(_.objective > expected * (1.0 + tol))
  }
}
