package repro.moo

/** Pareto-set utilities for 2-D minimization problems (latency, cost).
  *
  * Includes the O(n log n) skyline filter [Kung et al., 18], hypervolume
  * (the quality measure of Expt 5–7), and the Weighted-Utopia-Nearest
  * recommendation policy (§3.3.2) used to pick one configuration from a
  * Pareto front given a user preference vector.
  */
object Pareto {

  /** A point in objective space carrying its payload (the configuration). */
  final case class Sol[T](f1: Double, f2: Double, payload: T)

  /** `a` dominates `b`: no worse in both objectives, better in at least one. */
  def dominates(a: (Double, Double), b: (Double, Double)): Boolean =
    a._1 <= b._1 && a._2 <= b._2 && (a._1 < b._1 || a._2 < b._2)

  /** Non-dominated subset in O(n log n): sort by (f1, f2) and sweep keeping
    * strictly decreasing f2. Duplicate objective points are collapsed.
    */
  def skyline[T](points: Vector[Sol[T]]): Vector[Sol[T]] = {
    if (points.isEmpty) return points
    val sorted = points.sortBy(p => (p.f1, p.f2))
    val out = Vector.newBuilder[Sol[T]]
    var bestF2 = Double.PositiveInfinity
    sorted.foreach { p =>
      if (p.f2 < bestF2) { out += p; bestF2 = p.f2 }
    }
    out.result()
  }

  /** Hypervolume dominated by `front` w.r.t. reference point `ref` (both
    * objectives minimized; points beyond `ref` contribute nothing).
    */
  def hypervolume(front: Vector[(Double, Double)], ref: (Double, Double)): Double = {
    val clean = skyline(front.map { case (a, b) => Sol(a, b, ()) })
      .filter(p => p.f1 < ref._1 && p.f2 < ref._2)
    if (clean.isEmpty) return 0.0
    var hv = 0.0
    var prevF1 = ref._1
    // Sweep right-to-left in f1; each point adds a rectangle.
    clean.reverse.foreach { p =>
      hv += (prevF1 - p.f1) * (ref._2 - p.f2)
      prevF1 = p.f1
    }
    hv
  }

  /** Weighted Utopia Nearest: normalize the front to [0,1] per objective
    * (Utopia = the per-objective minima), then pick the point minimizing the
    * weighted Euclidean distance to Utopia.
    */
  def wun[T](front: Vector[Sol[T]], w: (Double, Double)): Sol[T] = {
    require(front.nonEmpty, "WUN over an empty front")
    if (front.size == 1) return front.head
    val min1 = front.map(_.f1).min; val max1 = front.map(_.f1).max
    val min2 = front.map(_.f2).min; val max2 = front.map(_.f2).max
    val r1 = math.max(1e-12, max1 - min1)
    val r2 = math.max(1e-12, max2 - min2)
    front.minBy { p =>
      val n1 = (p.f1 - min1) / r1
      val n2 = (p.f2 - min2) / r2
      math.sqrt(w._1 * n1 * n1 + w._2 * n2 * n2)
    }
  }
}
