package repro.env

/** Calibrated workload specs for the HiBench suite (§6.1: 6 tasks for the
  * end-to-end experiments, 16 for the meta-learning experiment).
  *
  * Characteristics (shuffle intensity, iteration counts, cache need, skew)
  * follow each benchmark's published behaviour; absolute scales target the
  * paper's small 4-node cluster.
  */
object Workloads {

  val WordCount: WorkloadSpec = WorkloadSpec("wordcount", inputGB = 32, cpuSecPerGB = 70,
    shuffleFrac = 0.2, numStages = 2, skew = 1.15, seed = 101)

  val Sort: WorkloadSpec = WorkloadSpec("sort", inputGB = 24, cpuSecPerGB = 40,
    shuffleFrac = 1.0, numStages = 2, memPerGBTask = 1.8, skew = 1.2, seed = 102)

  val TeraSort: WorkloadSpec = WorkloadSpec("terasort", inputGB = 32, cpuSecPerGB = 55,
    shuffleFrac = 1.0, numStages = 2, memPerGBTask = 2.0, skew = 1.35, seed = 103)

  val Repartition: WorkloadSpec = WorkloadSpec("repartition", inputGB = 24, cpuSecPerGB = 25,
    shuffleFrac = 1.0, numStages = 2, skew = 1.1, seed = 104)

  val Bayes: WorkloadSpec = WorkloadSpec("bayes", inputGB = 18, cpuSecPerGB = 140,
    shuffleFrac = 0.35, numStages = 4, iterations = 2, cachePerGB = 0.5,
    memPerGBTask = 1.8, skew = 1.3, seed = 105)

  val KMeans: WorkloadSpec = WorkloadSpec("kmeans", inputGB = 20, cpuSecPerGB = 110,
    shuffleFrac = 0.05, numStages = 2, iterations = 8, cachePerGB = 1.0,
    memPerGBTask = 1.4, skew = 1.15, seed = 106)

  val LR: WorkloadSpec = WorkloadSpec("lr", inputGB = 16, cpuSecPerGB = 130,
    shuffleFrac = 0.04, numStages = 2, iterations = 10, cachePerGB = 1.0,
    memPerGBTask = 1.4, skew = 1.1, seed = 107)

  val ALS: WorkloadSpec = WorkloadSpec("als", inputGB = 10, cpuSecPerGB = 180,
    shuffleFrac = 0.5, numStages = 3, iterations = 6, cachePerGB = 1.2,
    memPerGBTask = 1.8, skew = 1.3, seed = 108)

  val PCA: WorkloadSpec = WorkloadSpec("pca", inputGB = 8, cpuSecPerGB = 200,
    shuffleFrac = 0.3, numStages = 3, iterations = 3, cachePerGB = 0.8,
    memPerGBTask = 1.6, skew = 1.2, seed = 109)

  // Kept deliberately close to KMeans (same cache-bound iterative shape):
  // the paper's Table-4 pair KMeans←SVD presumes the two are similar.
  val SVD: WorkloadSpec = WorkloadSpec("svd", inputGB = 20, cpuSecPerGB = 150,
    shuffleFrac = 0.08, numStages = 2, iterations = 6, cachePerGB = 1.0,
    memPerGBTask = 1.4, skew = 1.2, seed = 110)

  val SVM: WorkloadSpec = WorkloadSpec("svm", inputGB = 14, cpuSecPerGB = 120,
    shuffleFrac = 0.05, numStages = 2, iterations = 10, cachePerGB = 1.0,
    memPerGBTask = 1.4, skew = 1.1, seed = 111)

  val GBT: WorkloadSpec = WorkloadSpec("gbt", inputGB = 10, cpuSecPerGB = 260,
    shuffleFrac = 0.15, numStages = 3, iterations = 12, cachePerGB = 1.0,
    memPerGBTask = 1.5, skew = 1.2, seed = 112)

  val RFC: WorkloadSpec = WorkloadSpec("rf", inputGB = 10, cpuSecPerGB = 240,
    shuffleFrac = 0.15, numStages = 3, iterations = 8, cachePerGB = 1.0,
    memPerGBTask = 1.5, skew = 1.2, seed = 113)

  val LDA: WorkloadSpec = WorkloadSpec("lda", inputGB = 9, cpuSecPerGB = 210,
    shuffleFrac = 0.4, numStages = 3, iterations = 8, cachePerGB = 1.1,
    memPerGBTask = 1.7, skew = 1.25, seed = 114)

  val PageRank: WorkloadSpec = WorkloadSpec("pagerank", inputGB = 12, cpuSecPerGB = 150,
    shuffleFrac = 0.8, numStages = 2, iterations = 8, cachePerGB = 1.4,
    memPerGBTask = 2.0, skew = 1.5, seed = 115)

  val NWeight: WorkloadSpec = WorkloadSpec("nweight", inputGB = 10, cpuSecPerGB = 190,
    shuffleFrac = 0.9, numStages = 2, iterations = 4, cachePerGB = 1.5,
    memPerGBTask = 2.2, skew = 1.6, seed = 116)

  /** The 6 representative tasks of §6.1. */
  val six: Vector[WorkloadSpec] = Vector(Bayes, KMeans, NWeight, WordCount, PageRank, TeraSort)

  /** The larger 16-task set used in the meta-learning experiment. */
  val sixteen: Vector[WorkloadSpec] = Vector(
    WordCount, Sort, TeraSort, Repartition, Bayes, KMeans, LR, ALS,
    PCA, SVD, SVM, GBT, RFC, LDA, PageRank, NWeight)

  def byName(name: String): WorkloadSpec =
    sixteen.find(_.name == name).getOrElse(
      throw new NoSuchElementException(s"unknown workload: $name"))
}
