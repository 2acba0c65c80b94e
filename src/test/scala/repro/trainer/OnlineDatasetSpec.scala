package repro.trainer

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.withTmpDir
import repro.datagen.CriteoLite
import repro.selector.{SelectedSample, TriggerSampleStorage, TriggerTrainingSet}
import repro.storage.{LocalFileSystemWrapper, SampleRegistry, StorageService}

class OnlineDatasetSpec extends AnyFunSuite {
  private val fs = new LocalFileSystemWrapper

  /** A Criteo-lite corpus + a trigger training set over a key subset. */
  private def setup(dir: String, n: Int, partitionSize: Int,
                    everyKth: Int = 1): (SampleRegistry, StorageService, TriggerTrainingSet) = {
    val registry = new SampleRegistry
    val metas    = CriteoLite.generate(fs, registry, s"$dir/data", n, samplesPerFile = 64)
    val storage  = new StorageService(registry, fs, sendBufferSize = 50)
    val tss      = new TriggerSampleStorage(fs, s"$dir/tss")
    val selected = metas.map(_.key).zipWithIndex.collect {
      case (k, i) if i % everyKth == 0 => SelectedSample(k, 1.0 + (k % 3))
    }
    val parts = selected.grouped(partitionSize).toIndexedSeq
    parts.zipWithIndex.foreach { case (p, i) => tss.writePartition(0, i, p, 3) }
    (registry, storage, TriggerTrainingSet(0, parts.size, selected.size, tss))
  }

  private def cfg(workers: Int, prefetch: Int = 1, parallel: Int = 1,
                  storageThreads: Int = 1, batch: Int = 32) =
    OnlineDatasetConfig(workers, batch, prefetch, parallel, storageThreads)

  private def collectKeys(ds: OnlineDataset): Seq[Long] =
    ds.batches().flatMap(_.keys).toSeq

  test("delivers every selected key exactly once (single worker, no prefetch)") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 200, partitionSize = 64)
      val ds = new OnlineDataset(new TssSource(tts), storage,
        new CriteoBytesParser(32), IdentityTransform, cfg(1, prefetch = 0))
      val keys = collectKeys(ds)
      assert(keys.sorted == tts.tss.readTrigger(0).map(_.key).sorted)
      r.close()
    }
  }

  test("delivers every key once for all worker/prefetch combinations") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 300, partitionSize = 50)
      val expected = tts.tss.readTrigger(0).map(_.key).sorted
      for {
        workers  <- Seq(1, 2, 4, 7)
        prefetch <- Seq(0, 1, 3)
        parallel <- Seq(1, 2)
      } {
        val ds = new OnlineDataset(new TssSource(tts), storage,
          new CriteoBytesParser(32), IdentityTransform,
          cfg(workers, prefetch, parallel))
        val keys = collectKeys(ds)
        assert(keys.sorted == expected,
          s"workers=$workers prefetch=$prefetch parallel=$parallel: ${keys.size} keys")
      }
      r.close()
    }
  }

  test("weights flow through with their keys") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 120, partitionSize = 40)
      val ds = new OnlineDataset(new TssSource(tts), storage,
        new CriteoBytesParser(32), IdentityTransform, cfg(3, prefetch = 2))
      val got = ds.batches().flatMap(b => b.keys.zip(b.weights)).toMap
      tts.tss.readTrigger(0).foreach(s => assert(got(s.key) == s.weight))
      r.close()
    }
  }

  test("labels match the registry metadata") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 100, partitionSize = 30)
      val ds = new OnlineDataset(new TssSource(tts), storage,
        new CriteoBytesParser(32), IdentityTransform, cfg(2))
      val got = ds.batches().flatMap(b => b.keys.zip(b.labels)).toMap
      (1L to 100L).foreach(k => assert(got(k).toLong == CriteoLite.labelOf(k, 42L)))
      r.close()
    }
  }

  test("features come from the parser + transform chain") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 40, partitionSize = 20)
      val parser = new CriteoBytesParser(16)
      val t      = new NormalizeTransform(0f, 2f)
      val ds = new OnlineDataset(new TssSource(tts), storage, parser, t, cfg(2))
      val got = ds.batches().flatMap(b => b.keys.zip(b.features)).toMap
      (1L to 40L).foreach { k =>
        val expect = t(parser.parse(CriteoLite.record(k, 42L)))
        assert(got(k).toSeq == expect.toSeq)
      }
      r.close()
    }
  }

  test("batches respect the batch size (only final per worker is partial)") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 250, partitionSize = 100)
      val ds = new OnlineDataset(new TssSource(tts), storage,
        new CriteoBytesParser(16), IdentityTransform, cfg(2, batch = 32))
      val sizes = ds.batches().map(_.size).toSeq
      assert(sizes.sum == 250)
      assert(sizes.forall(_ <= 32))
      assert(sizes.count(_ < 32) <= 2) // at most one partial per worker
      r.close()
    }
  }

  test("sparse selection (every 3rd key) retrieves only the selected keys") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 150, partitionSize = 25, everyKth = 3)
      val ds = new OnlineDataset(new TssSource(tts), storage,
        new CriteoBytesParser(16), IdentityTransform, cfg(2, prefetch = 2))
      val keys = collectKeys(ds)
      assert(keys.size == 50)
      assert(keys.sorted == tts.tss.readTrigger(0).map(_.key).sorted)
      r.close()
    }
  }

  test("more workers than samples in a partition still delivers all") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 10, partitionSize = 4)
      val ds = new OnlineDataset(new TssSource(tts), storage,
        new CriteoBytesParser(16), IdentityTransform, cfg(8, prefetch = 2))
      assert(collectKeys(ds).sorted == (1L to 10L))
      r.close()
    }
  }

  test("InMemorySource partitions and shares like the TSS") {
    val keys    = (1L to 103L).toArray
    val weights = keys.map(_ * 0.5)
    val src     = new InMemorySource(keys, weights, partitionSize = 10)
    assert(src.numPartitions == 11)
    assert(src.totalSamples == 103)
    for (workers <- Seq(1, 2, 5)) {
      val joined = (0 until src.numPartitions).flatMap { p =>
        (0 until workers).flatMap(w => src.workerShare(p, w, workers)._1)
      }
      assert(joined.sorted == keys.toSeq)
    }
  }

  test("a storage failure propagates to the consumer") {
    withTmpDir { dir =>
      val (r, storage, tts) = setup(dir, 50, partitionSize = 25)
      // Break the TSS by pointing a source at keys that don't exist.
      val src = new InMemorySource(Array(9999L), Array(1.0), 10)
      val ds = new OnlineDataset(src, storage, new CriteoBytesParser(16),
        IdentityTransform, cfg(1, prefetch = 1))
      intercept[NoSuchElementException] { ds.batches().toSeq }
      r.close()
    }
  }

  test("config validation") {
    intercept[IllegalArgumentException] { OnlineDatasetConfig(0, 1, 1, 1, 1) }
    intercept[IllegalArgumentException] { OnlineDatasetConfig(1, 0, 1, 1, 1) }
    intercept[IllegalArgumentException] { OnlineDatasetConfig(1, 1, -1, 1, 1) }
    intercept[IllegalArgumentException] { OnlineDatasetConfig(1, 1, 1, 0, 1) }
    intercept[IllegalArgumentException] { OnlineDatasetConfig(1, 1, 1, 1, 0) }
  }
}
