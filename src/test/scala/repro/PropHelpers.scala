package repro

import scala.util.Random

/** Small seeded property-testing helpers (scalatestplus is not available in
  * the offline image, so suites roll their own deterministic generators; the
  * scalacheck jar is additionally used by standalone `Properties` objects).
  */
trait PropHelpers {

  def withRandom[A](seed: Long = 20260814L)(f: Random => A): A = f(new Random(seed))

  /** Run `body` over `n` random printable-ish strings (including edge cases). */
  def forAllStrings(n: Int = 100, seed: Long = 1L)(body: String => Unit): Unit = {
    val rnd = new Random(seed)
    val edge = Seq("", " ", "a", "A", "0", "--", "\t", "null", "ÄÖÜ", "名前", "a b c")
    edge.foreach(body)
    (0 until n).foreach { _ =>
      val len = rnd.nextInt(24)
      val s = (0 until len).map { _ =>
        rnd.nextInt(5) match {
          case 0 => ('a' + rnd.nextInt(26)).toChar
          case 1 => ('A' + rnd.nextInt(26)).toChar
          case 2 => ('0' + rnd.nextInt(10)).toChar
          case 3 => ' '
          case _ => "-_./@#"(rnd.nextInt(6))
        }
      }.mkString
      body(s)
    }
  }

  /** Run `body` over `n` random unit-ish vectors of dimension `dim`. */
  def forAllVectors(dim: Int, n: Int = 50, seed: Long = 2L)(body: Array[Double] => Unit): Unit = {
    val rnd = new Random(seed)
    (0 until n).foreach { _ =>
      body(Array.fill(dim)(rnd.nextGaussian()))
    }
  }

  def assertApprox(a: Double, b: Double, tol: Double, hint: String = ""): Unit =
    assert(math.abs(a - b) <= tol, s"$hint: $a vs $b (tol $tol)")
}
