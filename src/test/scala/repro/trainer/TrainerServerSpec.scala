package repro.trainer

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.withTmpDir
import repro.datagen.CriteoLite
import repro.evaluator.{Evaluator, RocAuc}
import repro.selector.{DownsamplingConfig, SelectedSample, TriggerSampleStorage, TriggerTrainingSet}
import repro.storage.{LocalFileSystemWrapper, SampleRegistry, StorageService}

class TrainerServerSpec extends AnyFunSuite {
  private val fs = new LocalFileSystemWrapper

  private def setup(dir: String, n: Int): (SampleRegistry, StorageService, TriggerTrainingSet) = {
    val registry = new SampleRegistry
    val metas    = CriteoLite.generate(fs, registry, s"$dir/data", n, samplesPerFile = 200)
    val storage  = new StorageService(registry, fs, sendBufferSize = 128)
    val tss      = new TriggerSampleStorage(fs, s"$dir/tss")
    val selected = metas.map(m => SelectedSample(m.key, 1.0))
    val parts    = selected.grouped(500).toIndexedSeq
    parts.zipWithIndex.foreach { case (p, i) => tss.writePartition(0, i, p, 2) }
    (registry, storage, TriggerTrainingSet(0, parts.size, selected.size, tss))
  }

  private def runCfg(epochs: Int = 1, batch: Int = 128) = TrainingRunConfig(
    epochs = epochs, batchSize = batch, usePreviousModel = true,
    dataset = OnlineDatasetConfig(2, batch, 1, 1, 1), seed = 5)

  test("training consumes every sample once per epoch") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 1000)
      val parser  = new CriteoBytesParser(64)
      val trainer = new TrainerServer(storage, parser)
      val model   = new LogisticRegressionModel(parser.dim, SgdConfig(0.1), 1)
      val res = trainer.runTraining(model, tts, runCfg(epochs = 2))
      assert(res.samplesTrainedOn == 2000)
      assert(res.batches >= 2000 / 128)
      assert(res.downsampledTo.isEmpty)
      r.close()
    }
  }

  test("CTR model learns the synthetic ground truth (AUC > 0.6)") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 4000)
      val parser  = new CriteoBytesParser(64)
      val trainer = new TrainerServer(storage, parser)
      val model   = new LogisticRegressionModel(parser.dim, SgdConfig(0.5), 1)
      trainer.runTraining(model, tts, runCfg(epochs = 3))
      // Evaluate on held-out keys (fresh generator draws beyond the corpus).
      val eval = (5001L to 6000L).map { k =>
        (parser.parse(CriteoLite.record(k, 42L)), CriteoLite.labelOf(k, 42L).toInt)
      }
      val auc = Evaluator.evaluate(model, eval.iterator,
        decomposable = Seq.empty, holistic = Seq(new RocAuc)).head.value
      assert(auc > 0.6, s"AUC $auc")
      r.close()
    }
  }

  test("StB downsampling trains on the reduced set") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 1000)
      val parser  = new CriteoBytesParser(32)
      val trainer = new TrainerServer(storage, parser)
      val model   = new LogisticRegressionModel(parser.dim, SgdConfig(0.1), 1)
      val res = trainer.runTraining(model, tts, runCfg(),
        Some(DownsamplingConfig("GradNormCE", 0.5, sampleThenBatch = true)))
      assert(res.downsampledTo.contains(500L))
      assert(res.samplesTrainedOn == 500)
      r.close()
    }
  }

  test("BtS downsampling reduces each batch by the ratio") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 1024)
      val parser  = new CriteoBytesParser(32)
      val trainer = new TrainerServer(storage, parser)
      val model   = new LogisticRegressionModel(parser.dim, SgdConfig(0.1), 1)
      val res = trainer.runTraining(model, tts, runCfg(batch = 128),
        Some(DownsamplingConfig("Loss", 0.25, sampleThenBatch = false)))
      // Each 128-batch shrinks to 32 draws.
      assert(res.samplesTrainedOn == 1024 / 4)
      assert(res.downsampledTo.isEmpty)
      r.close()
    }
  }

  test("downsampled training still learns (AUC above random)") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 4000)
      val parser  = new CriteoBytesParser(64)
      val trainer = new TrainerServer(storage, parser)
      val model   = new LogisticRegressionModel(parser.dim, SgdConfig(0.5), 1)
      trainer.runTraining(model, tts, runCfg(epochs = 3),
        Some(DownsamplingConfig("GradNormCE", 0.5, sampleThenBatch = true)))
      val eval = (5001L to 6000L).map { k =>
        (parser.parse(CriteoLite.record(k, 42L)), CriteoLite.labelOf(k, 42L).toInt)
      }
      val auc = Evaluator.evaluate(model, eval.iterator,
        decomposable = Seq.empty, holistic = Seq(new RocAuc)).head.value
      assert(auc > 0.55, s"AUC $auc")
      r.close()
    }
  }

  test("training is deterministic for a fixed seed and single worker") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 500)
      val parser = new CriteoBytesParser(32)
      def run(): Array[Double] = {
        val trainer = new TrainerServer(storage, parser)
        val model   = new LogisticRegressionModel(parser.dim, SgdConfig(0.1), 1)
        val cfg = TrainingRunConfig(1, 100, usePreviousModel = true,
          OnlineDatasetConfig(1, 100, 0, 1, 1), seed = 5)
        trainer.runTraining(model, tts, cfg)
        model.weights
      }
      assert(run().toSeq == run().toSeq)
      r.close()
    }
  }

  test("wall clock and mean loss are recorded") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 300)
      val parser  = new CriteoBytesParser(32)
      val trainer = new TrainerServer(storage, parser)
      val model   = new LogisticRegressionModel(parser.dim, SgdConfig(0.1), 1)
      val res = trainer.runTraining(model, tts, runCfg())
      assert(res.wallClockMs >= 0)
      assert(res.meanLoss > 0)
      assert(res.triggerId == 0)
      r.close()
    }
  }
}
