package repro.selector

import org.apache.spark.sql.SparkSession
import repro.storage.FileSystemWrapper

/** Resolves pipeline-configured names into selection strategy / metadata
  * backend instances — the registry behind "add new policies as pluggable
  * modules and use the YAML file to select" (§3.5).
  */
object StrategyFactory {

  /** Build the metadata backend named by the pipeline's `storage_backend`
    * ("database" = embedded SQL, "local" = binary files, "spark" = growing
    * Parquet dataset).
    */
  def backend(kind: String, fs: FileSystemWrapper, dir: String,
              spark: Option[SparkSession]): MetadataBackend = kind match {
    case "database" => new DuckDbBackend
    case "local"    => new LocalBinaryBackend(fs, s"$dir/local_backend")
    case "spark"    =>
      new SparkParquetBackend(
        spark.getOrElse(throw new IllegalArgumentException(
          "spark backend requires a SparkSession")),
        s"$dir/parquet_backend")
    case other => throw new IllegalArgumentException(s"unknown storage backend '$other'")
  }

  /** Build the strategy named by the pipeline's `selection_strategy.name`.
    * Recognized config keys: `reset_after_trigger` (default true),
    * `limit`, `fraction`, `max_samples`, `memory_size`, and — for
    * `CoresetStrategy` — `presampling` (the wrapped presampler's name).
    */
  def strategy(name: String, config: Map[String, String],
               downsampling: Option[DownsamplingConfig],
               ctx: SelectorContext): SelectionStrategy = {
    val reset      = config.get("reset_after_trigger").forall(_.toBoolean)
    val limit      = config.get("limit").map(_.toDouble.toInt)
    val fraction   = config.get("fraction").map(_.toDouble)
    val maxSamples = config.get("max_samples").map(_.toDouble.toInt)

    def presampler(n: String): SelectionStrategy = n match {
      case "NewDataStrategy" => new NewDataStrategy(ctx, reset, limit)
      case "UniformRandomStrategy" =>
        new UniformRandomStrategy(ctx, reset, fraction, maxSamples)
      case "LabelBalancedStrategy"   => new LabelBalancedStrategy(ctx, reset, limit)
      case "TriggerBalancedStrategy" => new TriggerBalancedStrategy(ctx, reset, limit)
      case "GDumbStrategy" =>
        new GDumbStrategy(ctx,
          config.getOrElse("memory_size",
            throw new IllegalArgumentException("GDumbStrategy needs memory_size")).toDouble.toInt,
          reset)
      case other => throw new IllegalArgumentException(s"unknown selection strategy '$other'")
    }

    name match {
      case "CoresetStrategy" =>
        val pre = presampler(config.getOrElse("presampling", "NewDataStrategy"))
        new CoresetStrategy(pre,
          downsampling.getOrElse(throw new IllegalArgumentException(
            "CoresetStrategy needs a downsampling_config")))
      case other =>
        val s = presampler(other)
        downsampling match {
          case Some(ds) => new CoresetStrategy(s, ds)
          case None     => s
        }
    }
  }
}
