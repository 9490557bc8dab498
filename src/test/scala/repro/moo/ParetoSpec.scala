package repro.moo

import org.scalatest.funsuite.AnyFunSuite
import repro.TestProp.forAllSeeds
import repro.moo.Pareto._

/** Pareto utilities: dominance, skyline, hypervolume, WUN. */
class ParetoSpec extends AnyFunSuite {

  test("dominance requires no-worse in both and better in one") {
    assert(dominates((1, 1), (2, 2)))
    assert(dominates((1, 2), (1, 3)))
    assert(!dominates((1, 1), (1, 1)))
    assert(!dominates((1, 3), (2, 2)))
    assert(!dominates((2, 2), (1, 1)))
  }

  private def bruteSkyline(pts: Vector[Sol[Int]]): Set[(Double, Double)] =
    pts.filterNot(p => pts.exists(q => dominates((q.f1, q.f2), (p.f1, p.f2))))
      .map(p => (p.f1, p.f2)).toSet

  test("skyline matches the brute-force non-dominated set") {
    forAllSeeds(30) { rnd =>
      val pts = Vector.tabulate(60)(i => Sol(rnd.nextInt(20).toDouble, rnd.nextInt(20).toDouble, i))
      val fast = skyline(pts).map(p => (p.f1, p.f2)).toSet
      assert(fast == bruteSkyline(pts))
    }
  }

  test("skyline output is sorted by f1 with strictly decreasing f2") {
    forAllSeeds(20) { rnd =>
      val pts = Vector.tabulate(50)(i => Sol(rnd.nextDouble(), rnd.nextDouble(), i))
      val sky = skyline(pts)
      sky.sliding(2).foreach {
        case Vector(a, b) => assert(a.f1 <= b.f1 && a.f2 > b.f2)
        case _            => ()
      }
    }
  }

  test("skyline collapses duplicate objective points") {
    val sky = skyline(Vector(Sol(1.0, 1.0, 1), Sol(1.0, 1.0, 2)))
    assert(sky.size == 1)
  }

  test("skyline of an empty set is empty") {
    assert(skyline(Vector.empty[Sol[Int]]).isEmpty)
  }

  test("hypervolume of a single point is its rectangle to the reference") {
    assert(math.abs(hypervolume(Vector((1.0, 1.0)), (3.0, 3.0)) - 4.0) < 1e-12)
  }

  test("hypervolume of a staircase adds disjoint rectangles") {
    val hv = hypervolume(Vector((1.0, 2.0), (2.0, 1.0)), (3.0, 3.0))
    // (3-1)*(3-2) rectangle for the left point + (3-2)*(3-1) minus overlap:
    // sweep computes (3-2)*(3-1) + (2-1)*(3-2) = 2 + 1 = 3.
    assert(math.abs(hv - 3.0) < 1e-12)
  }

  test("points beyond the reference contribute nothing") {
    assert(hypervolume(Vector((4.0, 4.0)), (3.0, 3.0)) == 0.0)
  }

  test("hypervolume grows when a new non-dominated point is added") {
    forAllSeeds(20) { rnd =>
      val base = Vector((rnd.nextDouble() + 0.5, rnd.nextDouble() + 0.1))
      val extra = (base.head._1 - 0.4, base.head._2 + 0.5)
      val ref = (3.0, 3.0)
      assert(hypervolume(base :+ extra, ref) >= hypervolume(base, ref))
    }
  }

  test("hypervolume is invariant to dominated additions") {
    val front = Vector((1.0, 2.0), (2.0, 1.0))
    assert(hypervolume(front :+ (2.5, 2.5), (3.0, 3.0)) == hypervolume(front, (3.0, 3.0)))
  }

  test("WUN with full latency weight picks the latency extreme") {
    val front = Vector(Sol(1.0, 9.0, "fast"), Sol(5.0, 5.0, "mid"), Sol(9.0, 1.0, "cheap"))
    assert(wun(front, (1.0, 0.0)).payload == "fast")
    assert(wun(front, (0.0, 1.0)).payload == "cheap")
  }

  test("WUN with balanced weights picks an interior compromise") {
    val front = Vector(Sol(1.0, 9.0, "fast"), Sol(4.0, 4.0, "mid"), Sol(9.0, 1.0, "cheap"))
    assert(wun(front, (0.5, 0.5)).payload == "mid")
  }

  test("WUN over a single point returns it") {
    assert(wun(Vector(Sol(1.0, 2.0, "only")), (0.3, 0.7)).payload == "only")
  }

  test("WUN rejects an empty front") {
    intercept[IllegalArgumentException](wun(Vector.empty[Sol[Int]], (0.5, 0.5)))
  }

  test("WUN shifts monotonically along the front as weights shift") {
    val front = Vector.tabulate(11)(i => Sol(i.toDouble, 10.0 - i, i))
    val picks = Vector((0.0, 1.0), (0.3, 0.7), (0.7, 0.3), (1.0, 0.0))
      .map(w => wun(front, w).payload)
    assert(picks == picks.sorted.reverse || picks == picks.sorted)
    assert(picks.head == 10 && picks.last == 0) // lat weight 0 -> cheap end
  }
}
