package repro.trainer

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.withTmpDir
import repro.datagen.CriteoLite
import repro.storage.{LocalFileSystemWrapper, SampleRegistry}

class LocalFileDatasetSpec extends AnyFunSuite {
  private val fs = new LocalFileSystemWrapper

  private def gen(dir: String, n: Int): Seq[String] = {
    val r = new SampleRegistry
    CriteoLite.generate(fs, r, dir, n, samplesPerFile = 50)
    r.close()
    fs.list(dir)
  }

  test("emits every sample of every file exactly once") {
    withTmpDir { dir =>
      val files = gen(dir, 260)
      for (workers <- Seq(1, 2, 4, 8)) {
        val ds = new LocalFileDataset(fs, files, CriteoLite.RecordSize,
          new CriteoBytesParser(16), IdentityTransform, workers, batchSize = 32)
        val n = ds.batches().map(_.size).sum
        assert(n == 260, s"workers=$workers delivered $n")
      }
    }
  }

  test("labels match the generator") {
    withTmpDir { dir =>
      val files = gen(dir, 100)
      val ds = new LocalFileDataset(fs, files, CriteoLite.RecordSize,
        new CriteoBytesParser(16), IdentityTransform, 2, 32)
      val labels = ds.batches().flatMap(_.labels).toSeq.sorted
      val expect = (1L to 100L).map(CriteoLite.labelOf(_, 42L).toInt).sorted
      assert(labels == expect)
    }
  }

  test("more workers than files still delivers everything") {
    withTmpDir { dir =>
      val files = gen(dir, 60) // 2 files
      val ds = new LocalFileDataset(fs, files, CriteoLite.RecordSize,
        new CriteoBytesParser(16), IdentityTransform, 6, 16)
      assert(ds.batches().map(_.size).sum == 60)
    }
  }

  test("weights default to 1 (no sample-level selection)") {
    withTmpDir { dir =>
      val files = gen(dir, 50)
      val ds = new LocalFileDataset(fs, files, CriteoLite.RecordSize,
        new CriteoBytesParser(16), IdentityTransform, 1, 16)
      assert(ds.batches().flatMap(_.weights).forall(_ == 1.0))
    }
  }

  test("config validation") {
    intercept[IllegalArgumentException] {
      new LocalFileDataset(fs, Seq.empty, 160, new CriteoBytesParser(16),
        IdentityTransform, 0, 16)
    }
    intercept[IllegalArgumentException] {
      new LocalFileDataset(fs, Seq.empty, 4, new CriteoBytesParser(16),
        IdentityTransform, 1, 16)
    }
  }
}
