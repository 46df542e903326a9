package repro.video

/** Parameters of one synthetic video dataset (substitute for the paper's
  * real corpora — see DESIGN.md §2/§5 for the calibration).
  *
  * `rawPerVideo` counts the ~1–2 fps candidate frames the summarizer sees;
  * keyframes are the rising edges of the motion signal, one per
  * `keyPeriod` frames, so #keyframes = raw / keyPeriod. Raw counts are
  * chosen so that modeled processing time (0.08 s per keyframe, paper
  * Fig 11a) approximates Table III's processing column.
  */
final case class DatasetConfig(
    name: String,
    nVideos: Int,
    rawPerVideo: Int,
    keyPeriod: Int,
    bgMeanObjects: Double,
    bgClasses: IndexedSeq[String],
    bgColors: IndexedSeq[String],
    sceneCtx: IndexedSeq[String],
    traffic: Boolean) {

  require(keyPeriod >= 2, "keyPeriod must be >= 2 so every spike is a rising edge")
  require(rawPerVideo >= keyPeriod, "need at least one keyframe per video")

  def totalRawFrames: Long = nVideos.toLong * rawPerVideo

  /** Shrink the dataset for unit tests; keyframe ratio is preserved. */
  def scaled(s: Double): DatasetConfig =
    copy(rawPerVideo = math.max(keyPeriod * 3, math.round(rawPerVideo * s).toInt))
}

/** The five evaluation datasets (Table II + Table VI). */
object Datasets {

  val cityscapes: DatasetConfig = DatasetConfig(
    name = "cityscapes", nVideos = 1, rawPerVideo = 4425, keyPeriod = 3,
    bgMeanObjects = 5.0,
    bgClasses = IndexedSeq("person", "bicycle", "car", "truck"),
    bgColors = IndexedSeq("red", "white", "black", "grey", "blue", "silver"),
    sceneCtx = IndexedSeq("street", "road"),
    traffic = true)

  val bellevue: DatasetConfig = DatasetConfig(
    name = "bellevue", nVideos = 1, rawPerVideo = 7200, keyPeriod = 3,
    bgMeanObjects = 6.0,
    bgClasses = IndexedSeq("car", "bus", "truck", "suv"),
    // no "red": Q2.x's red cars are planted, so distractor pressure stays
    // under the planting spec's control (DESIGN.md §2)
    bgColors = IndexedSeq("white", "black", "grey", "silver", "blue"),
    sceneCtx = IndexedSeq("road", "intersection"),
    traffic = true)

  val qvhighlights: DatasetConfig = DatasetConfig(
    name = "qvhighlights", nVideos = 15, rawPerVideo = 292, keyPeriod = 3,
    bgMeanObjects = 4.0,
    bgClasses = IndexedSeq("woman", "man", "person", "dog", "car"),
    // no "white": Q3.3/Q3.4's white dogs are planted
    bgColors = IndexedSeq("black", "red", "blue", "grey"),
    sceneCtx = IndexedSeq("indoor", "outdoors"),
    traffic = false)

  val beach: DatasetConfig = DatasetConfig(
    name = "beach", nVideos = 1, rawPerVideo = 5820, keyPeriod = 3,
    bgMeanObjects = 5.0,
    bgClasses = IndexedSeq("bus", "truck", "car", "person"),
    // no "green": Q4.1/Q4.2's green buses are planted
    bgColors = IndexedSeq("white", "grey", "black", "blue"),
    sceneCtx = IndexedSeq("road", "sidewalk"),
    traffic = true)

  val activitynet: DatasetConfig = DatasetConfig(
    name = "activitynet", nVideos = 12, rawPerVideo = 186, keyPeriod = 3,
    bgMeanObjects = 5.0,
    bgClasses = IndexedSeq("person", "man", "woman", "car", "dog"),
    bgColors = IndexedSeq("white", "black", "red", "grey", "blue"),
    sceneCtx = IndexedSeq("room", "outdoors", "meadow"),
    traffic = false)

  val all: Seq[DatasetConfig] = Seq(cityscapes, bellevue, qvhighlights, beach, activitynet)

  def byName(name: String): DatasetConfig =
    all.find(_.name == name).getOrElse(sys.error(s"unknown dataset $name"))

  /** Background verbs deliberately disjoint from query verbs so that query
    * ground truth stays under the planting mechanism's control (bg objects
    * can still collide with fast-search key phrases — that is the noise
    * the rerank must overcome).
    */
  val BgActs: IndexedSeq[String] = IndexedSeq("moving", "idle")

  /** Background fine-attributes, disjoint from the query lexicon's. */
  val BgAtts: IndexedSeq[String] = IndexedSeq("plain", "shaded", "marked")
}
