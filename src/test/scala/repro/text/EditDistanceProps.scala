package repro.text

import org.scalacheck.{Gen, Prop, Properties}

/** ScalaCheck property suite for the edit-distance substrate. */
object EditDistanceProps extends Properties("EditDistance") {

  private val word: Gen[String] = Gen.stringOf(Gen.alphaLowerChar).map(_.take(12))

  property("symmetric") = Prop.forAll(word, word) { (a, b) =>
    EditDistance(a, b) == EditDistance(b, a)
  }

  property("zero iff equal") = Prop.forAll(word, word) { (a, b) =>
    (EditDistance(a, b) == 0) == (a == b)
  }

  property("bounded by max length") = Prop.forAll(word, word) { (a, b) =>
    EditDistance(a, b) <= math.max(a.length, b.length)
  }

  property("at least length difference") = Prop.forAll(word, word) { (a, b) =>
    EditDistance(a, b) >= math.abs(a.length - b.length)
  }

  property("single appended char costs exactly 1") = Prop.forAll(word) { a =>
    EditDistance(a, a + "x") == 1
  }

  property("similarity stays within [0,1]") = Prop.forAll(word, word) { (a, b) =>
    val s = Similarity.string(a, b)
    s >= 0.0 && s <= 1.0
  }
}
