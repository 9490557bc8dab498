package repro

import scala.util.Random

/** Lightweight deterministic property-testing helper: run `body` over `n`
  * seeded generators. (The image ships scalacheck but not the
  * scalatest-plus bridge, so suites drive randomized checks through this.)
  */
object TestProp {
  def forAllSeeds(n: Int = 50)(body: Random => Unit): Unit =
    (1 to n).foreach(i => body(new Random(i * 7919L)))
}
