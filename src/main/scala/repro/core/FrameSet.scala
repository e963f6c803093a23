package repro.core

import scala.collection.mutable.ArrayDeque

/** Mutable sorted frame-id set for one state.
  *
  * Frames are appended in increasing order and expire from the front as the
  * window slides, so an array deque gives O(1) amortized append/expire and
  * cheap size checks for the duration test. Merging (paper's `merge(F_s,F_ps)`)
  * is a sorted-union.
  */
final class FrameSet private (private val buf: ArrayDeque[Int]) extends Serializable {
  def this() = this(ArrayDeque.empty[Int])

  def size: Int = buf.size
  def isEmpty: Boolean = buf.isEmpty
  def nonEmpty: Boolean = buf.nonEmpty
  def last: Int = buf.last
  def head: Int = buf.head

  /** Append `fid`; no-op if already present as the newest element. */
  def append(fid: Int): Unit =
    if (buf.isEmpty || buf.last < fid) buf.append(fid)

  /** Drop all frames older than `winStart`. */
  def expire(winStart: Int): Unit =
    while (buf.nonEmpty && buf.head < winStart) buf.removeHead()

  /** Sorted union with another frame set (both stay sorted/deduped). */
  def mergeFrom(other: FrameSet): Unit = {
    if (other.buf.isEmpty) return
    if (buf.isEmpty || buf.last < other.buf.head) { buf.appendAll(other.buf); return }
    val merged = ArrayDeque.empty[Int]
    var i = 0; var j = 0
    val a = buf; val b = other.buf
    while (i < a.size && j < b.size) {
      val x = a(i); val y = b(j)
      if (x == y)     { merged.append(x); i += 1; j += 1 }
      else if (x < y) { merged.append(x); i += 1 }
      else            { merged.append(y); j += 1 }
    }
    while (i < a.size) { merged.append(a(i)); i += 1 }
    while (j < b.size) { merged.append(b(j)); j += 1 }
    buf.clear(); buf.appendAll(merged)
  }

  def toVector: Vector[Int] = buf.toVector

  def copy(): FrameSet = { val c = new FrameSet(); c.buf.appendAll(buf); c }

  override def toString: String = buf.mkString("[", ",", "]")
}
