package repro.storage

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.withTmpDir

class FileSystemWrapperSpec extends AnyFunSuite {
  private val fs = new LocalFileSystemWrapper

  test("write then readAll roundtrips") {
    withTmpDir { dir =>
      val bytes = Array.tabulate(1000)(i => (i % 251).toByte)
      fs.write(s"$dir/a.bin", bytes)
      assert(fs.readAll(s"$dir/a.bin").toSeq == bytes.toSeq)
    }
  }

  test("write creates missing parent directories") {
    withTmpDir { dir =>
      fs.write(s"$dir/x/y/z.bin", Array[Byte](1, 2, 3))
      assert(fs.exists(s"$dir/x/y/z.bin"))
    }
  }

  test("ranged read returns the exact slice") {
    withTmpDir { dir =>
      val bytes = Array.tabulate(256)(_.toByte)
      fs.write(s"$dir/a.bin", bytes)
      assert(fs.read(s"$dir/a.bin", 10, 5).toSeq == bytes.slice(10, 15).toSeq)
      assert(fs.read(s"$dir/a.bin", 0, 256).toSeq == bytes.toSeq)
      assert(fs.read(s"$dir/a.bin", 255, 1).toSeq == Seq(255.toByte))
    }
  }

  test("ranged read past EOF fails") {
    withTmpDir { dir =>
      fs.write(s"$dir/a.bin", Array[Byte](1, 2, 3))
      intercept[java.io.EOFException] { fs.read(s"$dir/a.bin", 2, 5) }
    }
  }

  test("size reports byte length") {
    withTmpDir { dir =>
      fs.write(s"$dir/a.bin", new Array[Byte](12345))
      assert(fs.size(s"$dir/a.bin") == 12345L)
    }
  }

  test("exists and delete") {
    withTmpDir { dir =>
      val p = s"$dir/a.bin"
      assert(!fs.exists(p))
      fs.write(p, Array[Byte](1))
      assert(fs.exists(p))
      fs.delete(p)
      assert(!fs.exists(p))
      fs.delete(p) // idempotent
    }
  }

  test("list returns sorted regular files only") {
    withTmpDir { dir =>
      fs.write(s"$dir/b.bin", Array[Byte](1))
      fs.write(s"$dir/a.bin", Array[Byte](1))
      fs.write(s"$dir/sub/c.bin", Array[Byte](1))
      val ls = fs.list(dir)
      assert(ls == Seq(s"$dir/a.bin", s"$dir/b.bin"))
    }
  }

  test("list of a missing directory is empty") {
    assert(fs.list("/nonexistent-path-xyz").isEmpty)
  }

  test("overwrite replaces content") {
    withTmpDir { dir =>
      fs.write(s"$dir/a.bin", Array[Byte](1, 2, 3, 4))
      fs.write(s"$dir/a.bin", Array[Byte](9))
      assert(fs.readAll(s"$dir/a.bin").toSeq == Seq(9.toByte))
    }
  }
}
