package repro.video

/** The six evaluation videos of §6.1, as generator profiles calibrated to the
  * published Table 6 statistics.
  *
  * V1/V2 are VisualRoad synthetic street scenes (few, long-lived objects),
  * D1/D2 are Detrac static traffic cameras (more objects per frame), and
  * M1/M2 are MOT16 *moving* cameras (short lifetimes, heavy churn — the
  * regime where SSG's pruning pays off, §6.2). Class mixes reflect the scene
  * type; only the four classes the paper retains are generated.
  */
object Profiles {

  private val road: Vector[(String, Double)] =
    Vector("car" -> 0.55, "person" -> 0.25, "truck" -> 0.12, "bus" -> 0.08)
  private val traffic: Vector[(String, Double)] =
    Vector("car" -> 0.70, "truck" -> 0.15, "bus" -> 0.10, "person" -> 0.05)
  private val street: Vector[(String, Double)] =
    Vector("person" -> 0.85, "car" -> 0.10, "truck" -> 0.03, "bus" -> 0.02)

  // name, frames, objects, F/Obj, Occ/Obj  — straight from Table 6.
  val V1: VideoProfile = VideoProfile("V1", 1800, 173, 76.71, 3.60, 6.0, road,    101L)
  val V2: VideoProfile = VideoProfile("V2", 1700, 127, 79.84, 6.33, 6.0, road,    102L)
  val D1: VideoProfile = VideoProfile("D1", 1150, 179, 48.61, 5.20, 5.0, traffic, 103L)
  val D2: VideoProfile = VideoProfile("D2", 1145, 158, 65.18, 7.23, 5.0, traffic, 104L)
  val M1: VideoProfile = VideoProfile("M1", 1194, 342, 23.67, 3.37, 4.0, street,  105L)
  val M2: VideoProfile = VideoProfile("M2",  750, 186, 46.96, 3.48, 4.0, street,  106L)

  val all: Vector[VideoProfile] = Vector(V1, V2, D1, D2, M1, M2)

  def byName(name: String): VideoProfile =
    all.find(_.name == name).getOrElse(
      throw new IllegalArgumentException(s"unknown profile $name (know: ${all.map(_.name).mkString(",")})"))

  /** The paper's Table 6 numbers, for paper-vs-measured reporting. */
  val paperTable6: Map[String, VideoStats] = Map(
    "V1" -> VideoStats(1800, 173, 7.37, 3.60, 76.71),
    "V2" -> VideoStats(1700, 127, 5.94, 6.33, 79.84),
    "D1" -> VideoStats(1150, 179, 7.56, 5.20, 48.61),
    "D2" -> VideoStats(1145, 158, 8.99, 7.23, 65.18),
    "M1" -> VideoStats(1194, 342, 6.75, 3.37, 23.67),
    "M2" -> VideoStats( 750, 186, 11.59, 3.48, 46.96),
  )
}
