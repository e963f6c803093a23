package repro

import scala.util.Random

/** Lightweight property-testing helper.
  *
  * The offline image ships scalatest and scalacheck but not the
  * `scalatestplus` bridge, so suites use this deterministic seed-loop instead
  * of `ScalaCheckPropertyChecks`: failures print the master seed so a run is
  * reproducible with a one-line change.
  */
trait RandomizedSpec {
  /** Number of random cases per property; override to rescale. */
  def cases: Int = 120

  def forSeeds(masterSeed: Long = 0xC0FFEE)(body: Random => Unit): Unit = {
    val master = new Random(masterSeed)
    (0 until cases).foreach { i =>
      val seed = master.nextLong()
      try body(new Random(seed))
      catch {
        case e: Throwable =>
          throw new AssertionError(s"failed at case $i (seed=$seed): ${e.getMessage}", e)
      }
    }
  }
}
