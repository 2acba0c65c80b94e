package repro.trainer

/** Resolves pipeline model / bytes-parser names — the model repository of
  * §4.1.3 ("other models can be trained in Modyn by adding the
  * implementation to the model repository").
  */
object ModelFactory {

  /** Build the model named by the pipeline (fresh random initialization). */
  def model(modelId: String, config: Map[String, Double], sgd: SgdConfig, seed: Long): Model =
    modelId match {
      case "LogisticRegression" | "DLRM" =>
        val hashDim = config.getOrElse("hash_dim", 128.0).toInt
        new LogisticRegressionModel(repro.datagen.CriteoLite.NumNumeric + hashDim, sgd, seed)
      case "SoftmaxRegression" | "ResNet18" | "ResNet50" =>
        new SoftmaxRegressionModel(
          config.getOrElse("feature_dim", 64.0).toInt,
          config.getOrElse("num_classes",
            throw new IllegalArgumentException(s"$modelId needs num_classes")).toInt,
          sgd, seed)
      case other => throw new IllegalArgumentException(s"unknown model '$other'")
    }

  /** Build the bytes parser named by the pipeline's data section. */
  def bytesParser(name: String, config: Map[String, Double]): BytesParser = name match {
    case "criteo" => new CriteoBytesParser(config.getOrElse("hash_dim", 128.0).toInt)
    case "cloc"   => new ClocBytesParser(config.getOrElse("feature_dim", 64.0).toInt)
    case other    => throw new IllegalArgumentException(s"unknown bytes parser '$other'")
  }
}
