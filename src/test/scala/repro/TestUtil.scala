package repro

import java.nio.file.Files
import java.util.Comparator

/** Shared test helpers: temp-dir scoping. */
object TestUtil {

  /** Run `f` with a fresh temp directory, deleting it afterwards. */
  def withTmpDir[T](f: String => T): T = {
    val dir = Files.createTempDirectory("repro-test")
    try f(dir.toString)
    finally {
      Files.walk(dir).sorted(Comparator.reverseOrder())
        .forEach(p => Files.deleteIfExists(p))
    }
  }
}
