package repro

import org.scalatest.Assertions._

object TestUtil {
  /** Asserts two state maps agree on every key of `a` within `tol`
    * (infinities must match exactly).
    */
  def assertClose(
      a: collection.Map[Long, Double],
      b: collection.Map[Long, Double],
      tol: Double,
      context: String = "",
  ): Unit = {
    a.foreach { case (v, x) =>
      val y = b.getOrElse(v, Double.NaN)
      if (x.isInfinite || y.isInfinite)
        assert(x == y, s"$context vertex $v: $x vs $y")
      else
        assert(math.abs(x - y) <= tol, s"$context vertex $v: $x vs $y (tol $tol)")
    }
    assert(a.size == b.size, s"$context state-set size ${a.size} vs ${b.size}")
  }
}
