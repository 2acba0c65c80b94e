package repro.core

import repro.core.yaml.{MiniYaml, YamlValue}
import repro.selector.DownsamplingConfig
import repro.trainer.{OnlineDatasetConfig, SgdConfig}

/** A fully validated Modyn pipeline definition (§3.5, Fig. 2): model,
  * dataset + bytes parser, triggering policy, data selection policy,
  * training hyperparameters, dataloader tuning, and the model storage
  * policy. Users author this as YAML and register it with the supervisor;
  * [[PipelineConfig.fromYaml]] is the CLI-side parsing + validation.
  */
final case class PipelineConfig(
    pipelineName: String,
    modelId: String,
    modelConfig: Map[String, Double],
    datasetId: String,
    bytesParser: String,
    triggerId: String,
    triggerConfig: Map[String, Double],
    usePreviousModel: Boolean,
    batchSize: Int,
    epochs: Int,
    sgd: SgdConfig,
    dataloader: OnlineDatasetConfig,
    partitionSize: Int,
    selectionName: String,
    selectionConfig: Map[String, String],
    downsampling: Option[DownsamplingConfig],
    fullModelInterval: Int,
    evalMetrics: Seq[String],
    seed: Long) {
  require(batchSize > 0, "batch_size must be positive")
  require(epochs > 0, "epochs must be positive")
  require(partitionSize > 0, "partition_size must be positive")
  require(fullModelInterval >= 1, "full model interval must be >= 1")
}

object PipelineConfig {

  /** Parse and validate a pipeline YAML document. Unknown strategy / model
    * / trigger names fail later at instantiation, with their own errors;
    * structural problems fail here with the offending key.
    */
  def fromYaml(text: String): PipelineConfig = {
    val y = MiniYaml.parse(text)

    def numMap(v: YamlValue): Map[String, Double] =
      v.map.collect { case (k, value) if value != repro.core.yaml.YamlNull => k -> value.num }

    def strMap(v: YamlValue): Map[String, String] =
      v.map.collect { case (k, value) if value != repro.core.yaml.YamlNull => k -> value.str }

    val model    = y("model")
    val data     = y("data")
    val trigger  = y("trigger")
    val training = y("training")
    val sel      = training("selection_strategy")

    val downsampling = sel.get("downsampling_config").map { d =>
      DownsamplingConfig(
        name = d("name").str,
        ratio = d("ratio").num,
        sampleThenBatch = d.get("sample_then_batch").forall(_.bool))
    }

    val optimizer = training.get("optimizer").getOrElse(yaml.YamlMap(Map.empty))

    PipelineConfig(
      pipelineName = y.get("pipeline").map(_.str).getOrElse("unnamed"),
      modelId = model("id").str,
      modelConfig = model.get("config").map(numMap).getOrElse(Map.empty),
      datasetId = data("dataset_id").str,
      bytesParser = data.get("bytes_parser").map(_.str).getOrElse(data("dataset_id").str),
      triggerId = trigger("id").str,
      triggerConfig = trigger.get("trigger_config").map(numMap).getOrElse(Map.empty),
      usePreviousModel = training.get("use_previous_model").forall(_.bool),
      batchSize = training("batch_size").int,
      epochs = training.get("epochs").map(_.int).getOrElse(1),
      sgd = SgdConfig(
        lr = optimizer.get("lr").map(_.num).getOrElse(0.01),
        momentum = optimizer.get("momentum").map(_.num).getOrElse(0.0),
        weightDecay = optimizer.get("weight_decay").map(_.num).getOrElse(0.0)),
      dataloader = OnlineDatasetConfig(
        numWorkers = training.get("dataloader_workers").map(_.int).getOrElse(1),
        batchSize = training("batch_size").int,
        prefetchedPartitions = training.get("prefetched_partitions").map(_.int).getOrElse(1),
        parallelPrefetchRequests =
          training.get("parallel_prefetch_requests").map(_.int).getOrElse(1),
        storageThreads = training.get("storage_threads").map(_.int).getOrElse(1)),
      partitionSize = training.get("partition_size").map(_.int).getOrElse(10000),
      selectionName = sel("name").str,
      selectionConfig = sel.get("config").map(strMap).getOrElse(Map.empty),
      downsampling = downsampling,
      fullModelInterval =
        y.get("model_storage").flatMap(_.get("full_model_interval")).map(_.int).getOrElse(1),
      evalMetrics = y.get("evaluation").flatMap(_.get("metrics"))
        .map(_.list.map(_.str)).getOrElse(Seq("Accuracy")),
      seed = y.get("seed").map(_.long).getOrElse(0L))
  }
}
