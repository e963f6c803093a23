package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.RandomizedSpec

/** Unit tests for the sorted frame-id deque underlying every state. */
class FrameSetSpec extends AnyFunSuite with RandomizedSpec {

  test("append keeps frames sorted and deduplicated") {
    val fs = new FrameSet
    fs.append(1); fs.append(3); fs.append(3); fs.append(7)
    assert(fs.toVector === Vector(1, 3, 7))
    assert(fs.size === 3)
  }

  test("append ignores a frame not newer than the last") {
    val fs = new FrameSet
    fs.append(5); fs.append(5)
    assert(fs.toVector === Vector(5))
  }

  test("expire drops strictly-older frames only") {
    val fs = new FrameSet
    (1 to 10).foreach(fs.append)
    fs.expire(4)
    assert(fs.toVector === Vector(4, 5, 6, 7, 8, 9, 10))
  }

  test("expire on empty set is a no-op") {
    val fs = new FrameSet
    fs.expire(100)
    assert(fs.isEmpty)
  }

  test("expire can empty the set") {
    val fs = new FrameSet
    fs.append(1); fs.append(2)
    fs.expire(10)
    assert(fs.isEmpty && fs.size === 0)
  }

  test("mergeFrom computes a sorted union") {
    val a = new FrameSet; Seq(1, 4, 6).foreach(a.append)
    val b = new FrameSet; Seq(2, 4, 9).foreach(b.append)
    a.mergeFrom(b)
    assert(a.toVector === Vector(1, 2, 4, 6, 9))
    assert(b.toVector === Vector(2, 4, 9))
  }

  test("mergeFrom with empty other is a no-op") {
    val a = new FrameSet; Seq(1, 2).foreach(a.append)
    a.mergeFrom(new FrameSet)
    assert(a.toVector === Vector(1, 2))
  }

  test("mergeFrom into empty copies the other") {
    val a = new FrameSet
    val b = new FrameSet; Seq(3, 5).foreach(b.append)
    a.mergeFrom(b)
    assert(a.toVector === Vector(3, 5))
  }

  test("mergeFrom fast-path when other is entirely newer") {
    val a = new FrameSet; Seq(1, 2).foreach(a.append)
    val b = new FrameSet; Seq(5, 6).foreach(b.append)
    a.mergeFrom(b)
    assert(a.toVector === Vector(1, 2, 5, 6))
  }

  test("copy is independent of the original") {
    val a = new FrameSet; Seq(1, 2).foreach(a.append)
    val c = a.copy()
    c.append(9); a.expire(2)
    assert(a.toVector === Vector(2))
    assert(c.toVector === Vector(1, 2, 9))
  }

  test("randomized: mergeFrom ≡ sorted distinct union") {
    forSeeds() { rnd =>
      val xs = Vector.fill(rnd.nextInt(30))(rnd.nextInt(100)).distinct.sorted
      val ys = Vector.fill(rnd.nextInt(30))(rnd.nextInt(100)).distinct.sorted
      val a = new FrameSet; xs.foreach(a.append)
      val b = new FrameSet; ys.foreach(b.append)
      a.mergeFrom(b)
      assert(a.toVector === (xs ++ ys).distinct.sorted)
    }
  }

  test("randomized: expire ≡ filter(_ >= start)") {
    forSeeds(0xE1) { rnd =>
      val xs = Vector.fill(rnd.nextInt(40))(rnd.nextInt(100)).distinct.sorted
      val start = rnd.nextInt(120)
      val fs = new FrameSet; xs.foreach(fs.append)
      fs.expire(start)
      assert(fs.toVector === xs.filter(_ >= start))
    }
  }
}
