package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}

class CountMinSketchSpec extends AnyFunSuite {

  private def check(prop: Prop): Unit =
    assert(SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(30), prop).passed)

  test("paper parameterization: ε=0.1, ν=0.01 gives w=28, d=5") {
    val cms = new CountMinSketch(0.1, 0.01)
    assert(cms.width == 28)  // ⌈e/0.1⌉ (the paper quotes 27 pre-ceiling)
    assert(cms.depth == 5)   // ⌈ln 100⌉ (the paper quotes 4.6 pre-ceiling)
  }

  test("empty sketch estimates zero") {
    val cms = new CountMinSketch()
    assert(cms.estimate(42L) == 0L)
    assert(cms.total == 0L)
  }

  test("single key exact") {
    val cms = new CountMinSketch()
    cms.add(7L, 5L)
    assert(cms.estimate(7L) == 5L)
  }

  test("estimates never underestimate") {
    val cms = new CountMinSketch()
    val truth = new java.util.HashMap[Long, Long]()
    (0 until 5000).foreach { i =>
      val key = (i % 200).toLong
      cms.add(key); truth.merge(key, 1L, _ + _)
    }
    truth.forEach((k, v) => assert(cms.estimate(k) >= v, s"key $k"))
  }

  test("error bounded by ε·N for the vast majority of keys") {
    val cms = new CountMinSketch(0.1, 0.01)
    val n = 10000
    (0 until n).foreach(i => cms.add((i % 500).toLong))
    val bound = (cms.epsilon * n).toLong
    val bad = (0 until 500).count { k =>
      cms.estimate(k.toLong) - n / 500 > bound
    }
    assert(bad == 0, s"$bad keys exceeded the ε·N additive bound")
  }

  test("tighter epsilon means wider table") {
    assert(new CountMinSketch(0.01, 0.01).width > new CountMinSketch(0.1, 0.01).width)
    assert(new CountMinSketch(0.1, 0.001).depth > new CountMinSketch(0.1, 0.01).depth)
  }

  test("stateBytes matches the w×d table") {
    val cms = new CountMinSketch(0.1, 0.01)
    assert(cms.stateBytes == 28L * 5 * 8)
  }

  test("property: estimate(k) >= true count, total = inserted weight") {
    check(Prop.forAll(Gen.listOfN(300, Gen.choose(0L, 50L))) { keys =>
      val cms = new CountMinSketch()
      val truth = keys.groupBy(identity).map { case (k, v) => (k, v.size.toLong) }
      keys.foreach(cms.add(_))
      truth.forall { case (k, c) => cms.estimate(k) >= c } &&
        cms.total == keys.size.toLong
    })
  }

  test("pairKey is symmetric and injective on ordered pairs") {
    assert(GenHash.pairKey(3, 9) == GenHash.pairKey(9, 3))
    val seen = collection.mutable.Set.empty[Long]
    for (a <- 0 until 50; b <- a until 50) {
      val key = GenHash.pairKey(a, b)
      assert(!seen.contains(key), s"collision at ($a,$b)")
      seen += key
    }
  }

  test("mix is deterministic and spreads inputs") {
    assert(GenHash.mix(12345L) == GenHash.mix(12345L))
    val outs = (0L until 1000L).map(GenHash.mix).toSet
    assert(outs.size == 1000)
  }
}
