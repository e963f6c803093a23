package repro.video

import scala.collection.mutable
import scala.util.Random

/** One tuple of the structured relation VR(fid, id, class) produced by the
  * paper's Object Detection/Tracking layer (§3). `vid` names the feed so the
  * Spark layer can process many feeds in parallel.
  */
final case class VRRow(vid: String, fid: Int, oid: Int, cls: String)

/** Statistics of a VR stream in the exact shape of the paper's Table 6. */
final case class VideoStats(frames: Int, objects: Int, objPerFrame: Double,
                            occPerObj: Double, framesPerObj: Double) {
  override def toString: String =
    f"frames=$frames objects=$objects Obj/F=$objPerFrame%.2f " +
    f"Occ/Obj=$occPerObj%.2f F/Obj=$framesPerObj%.2f"
}

/** A generated video feed: per-frame labelled object sets, fid-dense. */
final case class VideoStream(name: String, length: Int,
                             frames: Vector[Vector[(Int, String)]]) {
  def rows: Vector[VRRow] =
    frames.zipWithIndex.flatMap { case (objs, fid) =>
      objs.map { case (oid, cls) => VRRow(name, fid, oid, cls) }
    }

  /** Table 6 statistics: Objects counts distinct tracker ids, Obj/F averages
    * the per-frame set size, Occ/Obj counts disappear→reappear events per id,
    * F/Obj averages visible frames per id.
    */
  def stats: VideoStats = {
    val perId = mutable.LinkedHashMap.empty[Int, mutable.ArrayBuffer[Int]]
    frames.zipWithIndex.foreach { case (objs, fid) =>
      objs.foreach { case (oid, _) => perId.getOrElseUpdate(oid, mutable.ArrayBuffer.empty) += fid }
    }
    val nObj = perId.size
    val totalAppearances = perId.valuesIterator.map(_.size).sum
    val occlusions = perId.valuesIterator.map { fids =>
      fids.iterator.sliding(2).count { case Seq(a, b) => b > a + 1; case _ => false }
    }.sum
    VideoStats(
      frames = length,
      objects = nObj,
      objPerFrame = totalAppearances.toDouble / length,
      occPerObj = if (nObj == 0) 0 else occlusions.toDouble / nObj,
      framesPerObj = if (nObj == 0) 0 else totalAppearances.toDouble / nObj)
  }
}

/** Profile of one evaluation video, calibrated against the paper's Table 6.
  *
  * @param frames       video length in frames
  * @param objects      number of object tracks to generate
  * @param framesPerObj target mean visible frames per object (Table 6 F/Obj)
  * @param occPerObj    target mean occlusion events per object (Table 6 Occ/Obj)
  * @param meanGap      mean occlusion gap length in frames
  * @param classWeights sampling weights of the four §6.1 classes
  */
final case class VideoProfile(name: String, frames: Int, objects: Int,
                              framesPerObj: Double, occPerObj: Double,
                              meanGap: Double,
                              classWeights: Vector[(String, Double)],
                              seed: Long)

/** Synthetic substitute for Faster R-CNN + Deep SORT over the paper's videos
  * (see DESIGN.md §2): a deterministic object lifecycle simulator whose output
  * matches the Table 6 statistics that drive the cost of MCOS generation.
  *
  * Each object is born, stays visible for an exponential-mean lifespan split
  * into `occ+1` visible segments separated by occlusion gaps, then leaves.
  * The §6.2 occlusion knob `p_o` is reproduced exactly as described there:
  * each object id may be *reused* by up to `p_o` later objects after its
  * previous owner disappears.
  */
object SynthVideo {

  private final case class Track(birth: Int, cls: String, visibleFids: Vector[Int])

  /** Generate with one calibration pass: tracks truncated at the video edges
    * depress the realized F/Obj and Occ/Obj below the latent sampling means,
    * so the latent means are rescaled once by the measured shortfall. The
    * profile numbers are *targets* (the published Table 6 statistics), and
    * this keeps the realized statistics on them. Deterministic in `p.seed`.
    */
  def generate(p: VideoProfile, idReuse: Int = 0): VideoStream = {
    // Damped rescale (exponent < 1): a full-ratio step oscillates because a
    // parameter change also shifts the RNG draw paths; iterate toward the
    // fixpoint where realized ≈ target.
    def scale(target: Double, got: Double): Double =
      if (got <= 0) 1.0
      else math.pow(math.min(1.5, math.max(0.67, target / got)), 0.6)
    var adjusted = p
    var best = p
    var bestErr = Double.MaxValue
    (0 until 5).foreach { _ =>
      val probe = generateRaw(adjusted, idReuse = 0).stats
      val err = math.abs(probe.framesPerObj / p.framesPerObj - 1) +
                math.abs(probe.occPerObj / math.max(p.occPerObj, 1e-9) - 1)
      if (err < bestErr) { bestErr = err; best = adjusted }
      adjusted = adjusted.copy(
        framesPerObj = adjusted.framesPerObj * scale(p.framesPerObj, probe.framesPerObj),
        occPerObj = adjusted.occPerObj * scale(p.occPerObj, probe.occPerObj))
    }
    generateRaw(best, idReuse)
  }

  private def generateRaw(p: VideoProfile, idReuse: Int): VideoStream = {
    val rnd = new Random(p.seed)
    val weights = p.classWeights
    val totalW = weights.map(_._2).sum

    def sampleClass(): String = {
      var x = rnd.nextDouble() * totalW
      weights.foreach { case (c, w) => if (x < w) return c else x -= w }
      weights.last._1
    }

    def expLen(mean: Double): Int =
      math.max(1, math.round(-mean * math.log(1.0 - rnd.nextDouble())).toInt)

    // The standing population at frame 0 is objPerFrame = objects*F/Obj/N;
    // those tracks start mid-life, the rest are born uniformly over the video.
    val standing = math.max(0, math.round(p.objects * p.framesPerObj / p.frames).toInt)

    def buildTrack(i: Int): Track = {
      val visible = expLen(p.framesPerObj)
      val occ = {
        // Poisson(occPerObj), capped so every visible segment is non-empty.
        var k = 0; var l = math.exp(-p.occPerObj); var acc = rnd.nextDouble()
        while (acc > l && k < 50) { k += 1; acc *= rnd.nextDouble() }
        math.min(k, visible - 1)
      }
      // Split the visible span into occ+1 non-empty segments.
      val cuts = Vector.fill(occ)(1 + rnd.nextInt(math.max(1, visible - 1))).sorted.distinct
      val bounds = (0 +: cuts :+ visible).sliding(2).collect { case Seq(a, b) if b > a => b - a }.toVector
      val birth = if (i < standing) -rnd.nextInt(math.max(1, visible)) else rnd.nextInt(p.frames)
      var t = birth
      val fids = Vector.newBuilder[Int]
      bounds.zipWithIndex.foreach { case (seg, k) =>
        (0 until seg).foreach { j => val f = t + j; if (f >= 0 && f < p.frames) fids += f }
        t += seg
        if (k < bounds.size - 1) t += 1 + expLen(p.meanGap - 1)
      }
      Track(math.max(0, birth), sampleClass(), fids.result())
    }

    val tracks = Vector.tabulate(p.objects)(buildTrack).filter(_.visibleFids.nonEmpty)

    // Assign ids; with idReuse > 0 (the §6.2 p_o knob) an id returns to the
    // pool when its track ends and may be reused by at most p_o later tracks.
    val assigned: Vector[(Int, Track)] = {
      var nextId = 0
      // (freeFrom, id, reusesSoFar), min-heap on freeFrom
      val pool = mutable.PriorityQueue.empty[(Int, Int, Int)](Ordering.by(x => -x._1))
      tracks.sortBy(_.visibleFids.head).map { tr =>
        val start = tr.visibleFids.head
        val end = tr.visibleFids.last
        val id =
          if (idReuse > 0 && pool.nonEmpty && pool.head._1 <= start) {
            val (_, rid, reuses) = pool.dequeue()
            if (reuses + 1 < idReuse) pool.enqueue((end + 1, rid, reuses + 1))
            rid
          } else {
            val fresh = nextId; nextId += 1
            if (idReuse > 0) pool.enqueue((end + 1, fresh, 0))
            fresh
          }
        (id, tr)
      }
    }

    val perFrame = Array.fill(p.frames)(Vector.newBuilder[(Int, String)])
    assigned.foreach { case (id, tr) =>
      tr.visibleFids.foreach(f => perFrame(f) += ((id, tr.cls)))
    }
    VideoStream(p.name, p.frames, perFrame.toVector.map(_.result().distinct.sortBy(_._1)))
  }
}
