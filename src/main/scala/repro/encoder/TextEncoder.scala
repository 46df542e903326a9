package repro.encoder

/** Lexicon-based query parser + text encoder.
  *
  * Plays the paper's text transformer: a natural-language object query is
  * mapped to attribute tokens. Longest-match-first over a phrase lexicon,
  * so "side by side" wins over "side". The *fast-search* embedding keeps
  * only key-phrase categories (class/colour/attribute/context) per §VI-A —
  * relations, verbs and positional terms are intentionally dropped there
  * and only participate in the cross-modality rerank.
  */
object TextEncoder {
  import Vocab._

  /** Parsed query: ordered distinct tokens with categories. */
  final case class ParsedQuery(text: String, tokens: Seq[String]) {
    /** Tokens the fast-search single-vector encoder keeps. */
    def fastTokens: Seq[String] = tokens.filter(Vocab.isFast)
    /** All tokens — what the rerank transformer attends over. */
    def allTokens: Seq[String] = tokens
    /** Tokens dropped by fast search (relations / verbs / positions). */
    def droppedTokens: Seq[String] = tokens.filterNot(Vocab.isFast)
  }

  /** Phrase lexicon: surface phrase -> token. Checked longest-first. */
  val lexicon: Seq[(String, String)] = Seq(
    // relations / positions (rerank-only)
    "side by side"        -> token(Rel, "side_by_side"),
    "next to"             -> token(Rel, "next_to"),
    "positioned in the center" -> token(Loc, "center"),
    "in the center"       -> token(Loc, "center"),
    "inside a car"        -> token(Loc, "inside_car"),
    "inside car"          -> token(Loc, "inside_car"),
    "inside the car"      -> token(Loc, "inside_car"),
    "in the room"         -> token(Loc, "room"),
    // verbs / behaviours (rerank-only)
    "walking"             -> token(Act, "walking"),
    // "riding a bicycle" is deliberately NOT one phrase: the bicycle is a
    // visible object (a fast-search key phrase), only the act is dropped
    "riding"              -> token(Act, "riding"),
    "driving"             -> token(Act, "driving"),
    "smiling"             -> token(Act, "smiling"),
    "sitting"             -> token(Act, "sitting"),
    "dancing"             -> token(Act, "dancing"),
    "park"                -> token(Act, "parked"),
    "filled with cargo"   -> token(Att, "cargo"),
    // scene context (fast)
    "on the street"       -> token(Ctx, "street"),
    "on the road"         -> token(Ctx, "road"),
    "the road"            -> token(Ctx, "road"),
    "road"                -> token(Ctx, "road"),
    "street"              -> token(Ctx, "street"),
    "intersection"        -> token(Ctx, "intersection"),
    "meadow"              -> token(Ctx, "meadow"),
    "outdoors"            -> token(Ctx, "outdoors"),
    // fine attributes (fast)
    "holding a dark bag"  -> token(Att, "dark_bag"),
    "black t-shirt"       -> token(Att, "black_tshirt"),
    "blue jeans"          -> token(Att, "blue_jeans"),
    "white roof"          -> token(Att, "white_roof"),
    "red-hair"            -> token(Att, "red_hair"),
    "white dress"         -> token(Att, "white_dress"),
    "black clothes"       -> token(Att, "black_clothes"),
    "wearing a hat"       -> token(Att, "hat"),
    "with a hat"          -> token(Att, "hat"),
    "red life jacket"     -> token(Att, "life_jacket"),
    "life jacket"         -> token(Att, "life_jacket"),
    "grey skirt"          -> token(Att, "grey_skirt"),
    "yellow-green body"   -> token(Col, "yellow_green"),
    // colours (fast)
    "light-colored"       -> token(Col, "light_colored"),
    "red"                 -> token(Col, "red"),
    "white"               -> token(Col, "white"),
    "black"               -> token(Col, "black"),
    "green"               -> token(Col, "green"),
    "blue"                -> token(Col, "blue"),
    "grey"                -> token(Col, "grey"),
    "small"               -> token(Att, "small"),
    "large"               -> token(Att, "large"),
    // classes (fast)
    "person"              -> token(Cls, "person"),
    "woman"               -> token(Cls, "woman"),
    "man"                 -> token(Cls, "man"),
    "car"                 -> token(Cls, "car"),
    "suv"                 -> token(Cls, "suv"),
    "bus"                 -> token(Cls, "bus"),
    "truck"               -> token(Cls, "truck"),
    "bicycle"             -> token(Cls, "bicycle"),
    "dog"                 -> token(Cls, "dog"),
  ).sortBy { case (phrase, _) => -phrase.length }

  /** Parse a query string to its ordered distinct token set.
    *
    * Scans left to right; at each position tries lexicon phrases longest
    * first; on a match consumes the phrase. Word boundaries respected.
    */
  def parse(text: String): ParsedQuery = {
    val s = text.toLowerCase
    val found = scala.collection.mutable.LinkedHashSet[String]()
    var i = 0
    while (i < s.length) {
      if (i == 0 || !s.charAt(i - 1).isLetterOrDigit) {
        lexicon.find { case (phrase, _) =>
          s.startsWith(phrase, i) && {
            val end = i + phrase.length
            end >= s.length || !s.charAt(end).isLetterOrDigit
          }
        } match {
          case Some((phrase, tok)) => found += tok; i += phrase.length
          case None                => i += 1
        }
      } else i += 1
    }
    ParsedQuery(text, found.toSeq)
  }

  /** Single-vector fast-search query embedding (key phrases only). */
  def fastEmbedding(q: ParsedQuery): Array[Float] =
    SemanticSpace.embedText(if (q.fastTokens.nonEmpty) q.fastTokens else q.tokens)

  /** Per-token text features for the rerank cross-attention (all tokens). */
  def rerankTokenEmbeddings(q: ParsedQuery): Seq[Array[Float]] =
    q.allTokens.map(t => SemanticSpace.embedText(Seq(t)))
}
