package repro.space

/** The 30-parameter Spark configuration space used throughout the paper
  * (the Tuneful [24] parameter set: §6.1 "Spark Parameters").
  *
  * Ranges follow the Spark 3.x documentation defaults scaled to the target
  * cluster size; per §6.1 "the value ranges of the parameters are set
  * differently depending on the cluster size", so the resource maxima are
  * constructor arguments.
  */
object SparkParams {

  val Instances        = "spark.executor.instances"
  val ExecCores        = "spark.executor.cores"
  val ExecMemory       = "spark.executor.memory"            // GB
  val MemoryOverhead   = "spark.executor.memoryOverhead"    // MB
  val DriverCores      = "spark.driver.cores"
  val DriverMemory     = "spark.driver.memory"              // GB
  val MemoryFraction   = "spark.memory.fraction"
  val StorageFraction  = "spark.memory.storageFraction"
  val Parallelism      = "spark.default.parallelism"
  val ShufflePartitions= "spark.sql.shuffle.partitions"
  val ShuffleFileBuffer= "spark.shuffle.file.buffer"        // KB
  val ShuffleCompress  = "spark.shuffle.compress"
  val SpillCompress    = "spark.shuffle.spill.compress"
  val IoCodec          = "spark.io.compression.codec"
  val Serializer       = "spark.serializer"
  val KryoBuffer       = "spark.kryoserializer.buffer"      // KB
  val MaxSizeInFlight  = "spark.reducer.maxSizeInFlight"    // MB
  val BypassMergeThr   = "spark.shuffle.sort.bypassMergeThreshold"
  val Speculation      = "spark.speculation"
  val BroadcastBlock   = "spark.broadcast.blockSize"        // MB
  val RddCompress      = "spark.rdd.compress"
  val BroadcastCompress= "spark.broadcast.compress"
  val LocalityWait     = "spark.locality.wait"              // s
  val ReviveInterval   = "spark.scheduler.revive.interval"  // ms
  val NetworkTimeout   = "spark.network.timeout"            // s
  val TaskMaxFailures  = "spark.task.maxFailures"
  val ConnsPerPeer     = "spark.shuffle.io.numConnectionsPerPeer"
  val MemoryMapThr     = "spark.storage.memoryMapThreshold" // MB
  val AutoBroadcastThr = "spark.sql.autoBroadcastJoinThreshold" // MB
  val MaxPartitionBytes= "spark.sql.files.maxPartitionBytes"    // MB

  /** Build the 30-dim space for a cluster that can host at most
    * `maxInstances` executors of up to `maxCores` cores / `maxMemGB` GB.
    */
  def space(maxInstances: Int = 384, maxCores: Int = 8, maxMemGB: Int = 32): ConfigSpace =
    new ConfigSpace(Vector(
      IntParam(Instances, 1, maxInstances, log = true),
      IntParam(ExecCores, 1, maxCores),
      IntParam(ExecMemory, 1, maxMemGB, log = true),
      IntParam(MemoryOverhead, 128, 4096, log = true),
      IntParam(DriverCores, 1, 4),
      IntParam(DriverMemory, 1, 8),
      DoubleParam(MemoryFraction, 0.3, 0.9),
      DoubleParam(StorageFraction, 0.1, 0.9),
      IntParam(Parallelism, 8, 2000, log = true),
      IntParam(ShufflePartitions, 8, 2000, log = true),
      IntParam(ShuffleFileBuffer, 16, 128, log = true),
      CatParam(ShuffleCompress, Vector("true", "false")),
      CatParam(SpillCompress, Vector("true", "false")),
      CatParam(IoCodec, Vector("lz4", "snappy", "zstd")),
      CatParam(Serializer, Vector("org.apache.spark.serializer.JavaSerializer",
                                  "org.apache.spark.serializer.KryoSerializer")),
      IntParam(KryoBuffer, 32, 128),
      IntParam(MaxSizeInFlight, 24, 144),
      IntParam(BypassMergeThr, 100, 1000),
      CatParam(Speculation, Vector("false", "true")),
      IntParam(BroadcastBlock, 1, 16),
      CatParam(RddCompress, Vector("false", "true")),
      CatParam(BroadcastCompress, Vector("true", "false")),
      DoubleParam(LocalityWait, 0.0, 10.0),
      IntParam(ReviveInterval, 100, 1000),
      IntParam(NetworkTimeout, 60, 600),
      IntParam(TaskMaxFailures, 1, 8),
      IntParam(ConnsPerPeer, 1, 5),
      IntParam(MemoryMapThr, 1, 10),
      IntParam(AutoBroadcastThr, 0, 64),
      IntParam(MaxPartitionBytes, 16, 512, log = true),
    ))

  /** Spark's out-of-the-box defaults, clipped into the space's ranges. */
  def defaults(cs: ConfigSpace): Config = {
    var c = Config(Vector.tabulate(cs.dim) { i =>
      cs.params(i) match {
        case IntParam(_, lo, _, _)    => lo.toDouble
        case DoubleParam(_, lo, _, _) => lo
        case CatParam(_, _)           => 0.0
      }
    })
    def set(name: String, v: Double): Unit = { c = cs.withValue(c, name, v) }
    set(Instances, 2); set(ExecCores, 1); set(ExecMemory, 1)
    set(MemoryOverhead, 384); set(DriverCores, 1); set(DriverMemory, 1)
    set(MemoryFraction, 0.6); set(StorageFraction, 0.5)
    // Spark's default.parallelism ~= total cores — tiny next to what a
    // large input needs (the classic default-config catastrophe on RDD
    // jobs); spark.sql.shuffle.partitions defaults to 200.
    set(Parallelism, 8); set(ShufflePartitions, 200)
    set(ShuffleFileBuffer, 32); set(KryoBuffer, 64)
    set(MaxSizeInFlight, 48); set(BypassMergeThr, 200)
    set(BroadcastBlock, 4); set(LocalityWait, 3.0)
    set(ReviveInterval, 1000); set(NetworkTimeout, 120)
    set(TaskMaxFailures, 4); set(ConnsPerPeer, 1)
    set(MemoryMapThr, 2); set(AutoBroadcastThr, 10); set(MaxPartitionBytes, 128)
    cs.clip(c)
  }

  /** Expert initial importance ranking used before any tuning history
    * exists (§4.1 "We start with an initial parameter ranking suggested
    * by experts"). Order mirrors Table 5 plus sensible tails. */
  val ExpertRanking: Vector[String] = Vector(
    Instances, ExecMemory, StorageFraction, Parallelism, MemoryFraction,
    ExecCores, IoCodec, ShuffleFileBuffer, ShuffleCompress, Serializer,
    ShufflePartitions, MaxSizeInFlight, SpillCompress, MemoryOverhead,
    MaxPartitionBytes, RddCompress, BypassMergeThr, KryoBuffer, LocalityWait,
    Speculation, BroadcastBlock, BroadcastCompress, DriverMemory, DriverCores,
    NetworkTimeout, ReviveInterval, TaskMaxFailures, ConnsPerPeer,
    MemoryMapThr, AutoBroadcastThr,
  )
}
