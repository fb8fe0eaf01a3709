package repro

import scala.util.Random

/** Seeded property-style loops (scalatestplus-scalacheck is not in the
  * offline cache, so properties run as deterministic seeded iterations).
  */
trait PropUtil {
  def forAllSeeded(iterations: Int = 100, seed: Long = 1234L)(body: Random => Unit): Unit = {
    var i = 0
    while (i < iterations) {
      val r = new Random(seed + i)
      try body(r)
      catch {
        case e: Throwable =>
          throw new AssertionError(s"property failed at iteration $i (seed ${seed + i})", e)
      }
      i += 1
    }
  }

  def randomAscii(r: Random, maxLen: Int): String = {
    val n = r.nextInt(maxLen + 1)
    (1 to n).map(_ => (32 + r.nextInt(95)).toChar).mkString
  }

  def randomBytes(r: Random, maxLen: Int): Array[Byte] = {
    val b = new Array[Byte](r.nextInt(maxLen + 1))
    r.nextBytes(b)
    b
  }
}
