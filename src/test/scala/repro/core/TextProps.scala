package repro.core

import org.scalacheck.{Gen, Prop, Properties}

/** ScalaCheck properties for the similarity substrate (native scalacheck
  * runner; complements the seeded-loop tests in TextSpec/PruningSpec).
  */
object TextProps extends Properties("Text") {

  private val tokenSet: Gen[Set[String]] =
    Gen.listOf(Gen.oneOf((0 until 12).map(i => s"t$i"))).map(_.toSet)

  property("jaccard within [0,1]") = Prop.forAll(tokenSet, tokenSet) { (a, b) =>
    val j = Text.jaccard(a, b)
    j >= 0.0 && j <= 1.0
  }

  property("jaccard symmetric") = Prop.forAll(tokenSet, tokenSet) { (a, b) =>
    Text.jaccard(a, b) == Text.jaccard(b, a)
  }

  property("jaccard identity") = Prop.forAll(tokenSet) { a =>
    Text.jaccard(a, a) == 1.0
  }

  property("jdist triangle inequality") = Prop.forAll(tokenSet, tokenSet, tokenSet) { (a, b, c) =>
    Text.jdist(a, c) <= Text.jdist(a, b) + Text.jdist(b, c) + 1e-12
  }

  property("tokens of canonical form round-trip") = Prop.forAll(tokenSet) { a =>
    Text.tokens(a.toSeq.sorted.mkString(" ")) == a
  }

  property("size bound dominates similarity") = Prop.forAll(tokenSet, tokenSet) { (a, b) =>
    Text.jaccard(a, b) <= Pruning.ubSimSizeAttr(a.size, a.size, b.size, b.size) + 1e-12
  }

  property("minDistGap lower-bounds |x - y| for points in the intervals") =
    Prop.forAll(Gen.choose(0.0, 1.0), Gen.choose(0.0, 1.0)) { (x, y) =>
      Pruning.minDistGap(x, x, y, y) <= math.abs(x - y) + 1e-12
    }
}
