package repro.encoder

import org.scalatest.funsuite.AnyFunSuite

class TextEncoderSpec extends AnyFunSuite {
  import TextEncoder._
  import Vocab._

  private def toks(text: String): Set[String] = parse(text).tokens.toSet

  test("Q1.1 parses to person/walking/street") {
    assert(toks("A person walking on the street.") ==
      Set("cls:person", "act:walking", "ctx:street"))
  }

  test("Q1.2 parses colour + attribute + verb") {
    assert(toks("A person in light-colored clothing walking while holding a dark bag.") ==
      Set("cls:person", "col:light_colored", "act:walking", "att:dark_bag"))
  }

  test("Q1.3 keeps the bicycle as an object class; only the verb is rerank-only") {
    val p = parse("A person riding a bicycle.")
    assert(p.tokens.toSet == Set("cls:person", "act:riding", "cls:bicycle"))
    assert(p.fastTokens.toSet == Set("cls:person", "cls:bicycle"))
  }

  test("Q1.4 adds clothing attributes to Q1.3") {
    assert(toks("A person riding a bicycle, wearing a black t-shirt and blue jeans.") ==
      Set("cls:person", "act:riding", "cls:bicycle", "att:black_tshirt", "att:blue_jeans"))
  }

  test("Q2.1 parses red car, driving, centre, road") {
    assert(toks("A red car driving in the center of the road.") ==
      Set("col:red", "cls:car", "act:driving", "loc:center", "ctx:road"))
  }

  test("Q2.2 parses the relational sentence") {
    assert(toks("A red car side by side with another car, both positioned in the center of the road.") ==
      Set("col:red", "cls:car", "rel:side_by_side", "loc:center", "ctx:road"))
  }

  test("Q2.3 and Q2.4 parse; Q2.4 strictly extends Q2.3") {
    val a = toks("A bus driving on the road.")
    val b = toks("A bus driving on the road with white roof and yellow-green body.")
    assert(a == Set("cls:bus", "act:driving", "ctx:road"))
    assert(a.subsetOf(b))
    assert(b.contains("att:white_roof") && b.contains("col:yellow_green"))
  }

  test("Q3 queries parse (qvhighlights)") {
    assert(toks("A woman smiling sitting inside car.") ==
      Set("cls:woman", "act:smiling", "act:sitting", "loc:inside_car"))
    assert(toks("A red-hair woman with white dress sitting inside a car.") ==
      Set("att:red_hair", "cls:woman", "att:white_dress", "act:sitting", "loc:inside_car"))
    assert(toks("A white dog inside a car.") ==
      Set("col:white", "cls:dog", "loc:inside_car"))
    assert(toks("A white dog inside a car, next to a woman wearing black clothes.") ==
      Set("col:white", "cls:dog", "loc:inside_car", "rel:next_to", "cls:woman", "att:black_clothes"))
  }

  test("Q4 queries parse (beach)") {
    assert(toks("A green bus driving on the road.") ==
      Set("col:green", "cls:bus", "act:driving", "ctx:road"))
    assert(toks("A green bus with the white roof driving on the road.") ==
      Set("col:green", "cls:bus", "att:white_roof", "act:driving", "ctx:road"))
    assert(toks("A truck driving on the road.") ==
      Set("cls:truck", "act:driving", "ctx:road"))
    assert(toks("A small white truck filled with cargo driving on the road.") ==
      Set("att:small", "col:white", "cls:truck", "att:cargo", "act:driving", "ctx:road"))
  }

  test("ActivityNet-QA extension queries parse") {
    assert(toks("does the car park on the meadow") ==
      Set("cls:car", "act:parked", "ctx:meadow"))
    assert(toks("is the person with a hat a man") ==
      Set("cls:person", "att:hat", "cls:man"))
    assert(toks("is the person in the red life jacket outdoors") ==
      Set("cls:person", "att:life_jacket", "ctx:outdoors"))
    assert(toks("is the person in a grey skirt dancing in the room") ==
      Set("cls:person", "att:grey_skirt", "act:dancing", "loc:room"))
  }

  test("longest-match wins: 'white roof' is an attribute, not the colour white") {
    val t = toks("a bus with white roof")
    assert(t.contains("att:white_roof"))
    assert(!t.contains("col:white"))
  }

  test("word boundaries are respected") {
    // 'carpet' must not match 'car'
    assert(!toks("a carpet on the floor").contains("cls:car"))
  }

  test("fast tokens exclude relations, verbs and positions") {
    val p = parse("A red car side by side with another car, both positioned in the center of the road.")
    assert(p.fastTokens.toSet == Set("col:red", "cls:car", "ctx:road"))
    assert(p.droppedTokens.toSet == Set("rel:side_by_side", "loc:center"))
  }

  test("fast + dropped partition the token set") {
    for (q <- Seq(
      "A person walking on the street.",
      "A red car driving in the center of the road.",
      "A white dog inside a car, next to a woman wearing black clothes.")) {
      val p = parse(q)
      assert((p.fastTokens ++ p.droppedTokens).toSet == p.tokens.toSet)
      assert(p.fastTokens.intersect(p.droppedTokens).isEmpty)
    }
  }

  test("parsing is case-insensitive") {
    assert(toks("A RED CAR ON THE ROAD") == toks("a red car on the road"))
  }

  test("duplicate phrases yield one token") {
    val p = parse("car car car")
    assert(p.tokens == Seq("cls:car"))
  }

  test("fastEmbedding falls back to all tokens when no key phrases") {
    val p = parse("walking")
    assert(p.fastTokens.isEmpty)
    val e = fastEmbedding(p)
    assert(e.sameElements(SemanticSpace.embedText(p.tokens)))
  }

  test("rerankTokenEmbeddings yields one vector per token") {
    val p = parse("A red car driving in the center of the road.")
    assert(rerankTokenEmbeddings(p).size == p.tokens.size)
  }

  test("category helpers round-trip") {
    assert(category(token(Cls, "car")) == Cls)
    assert(value(token(Col, "red")) == "red")
    assert(isFast(token(Cls, "car")))
    assert(!isFast(token(Rel, "next_to")))
  }
}
