package repro.util

import org.scalatest.funsuite.AnyFunSuite
import repro.testkit.PropertyChecks

class RngSpec extends AnyFunSuite with PropertyChecks {

  test("mix is deterministic") {
    forAllLongs() { x => assert(Rng.mix(x) == Rng.mix(x)) }
  }

  test("mix avalanche: adjacent inputs differ") {
    forAllLongs() { x =>
      if (x != Long.MaxValue) assert(Rng.mix(x) != Rng.mix(x + 1))
    }
  }

  test("two-arg mix is order-sensitive") {
    assert(Rng.mix(1L, 2L) != Rng.mix(2L, 1L))
  }

  test("uniform lies in [0,1)") {
    forAllLongs() { k =>
      val u = Rng.uniform(k)
      assert(u >= 0.0 && u < 1.0)
    }
  }

  test("uniform(key, salt) deterministic and salt-sensitive") {
    forAllLongs() { k =>
      assert(Rng.uniform(k, 1L) == Rng.uniform(k, 1L))
      assert(Rng.uniform(k, 1L) != Rng.uniform(k, 2L))
    }
  }

  test("uniform mean is near 0.5 over many keys") {
    val n = 20000
    val mean = (0 until n).map(i => Rng.uniform(i.toLong, 7L)).sum / n
    assert(math.abs(mean - 0.5) < 0.01, s"mean=$mean")
  }

  test("gaussian has ~0 mean and ~unit variance") {
    val n = 20000
    val xs = (0 until n).map(i => Rng.gaussian(i.toLong, 3L))
    val mean = xs.sum / n
    val variance = xs.map(x => (x - mean) * (x - mean)).sum / n
    assert(math.abs(mean) < 0.03, s"mean=$mean")
    assert(math.abs(variance - 1.0) < 0.05, s"var=$variance")
  }

  test("gaussian is deterministic") {
    forAllLongs() { k =>
      assert(Rng.gaussian(k, 3L) == Rng.gaussian(k, 3L))
    }
  }

  test("int stays within bounds") {
    forAllLongs() { k =>
      val i = Rng.int(k, 5L, 7)
      assert(i >= 0 && i < 7)
    }
  }

  test("int rejects non-positive n") {
    intercept[IllegalArgumentException] { Rng.int(1L, 2L, 0) }
  }

  test("int covers the full range") {
    val seen = (0 until 2000).map(i => Rng.int(i.toLong, 11L, 5)).toSet
    assert(seen == Set(0, 1, 2, 3, 4))
  }

  test("hashString deterministic and content-sensitive") {
    assert(Rng.hashString("car") == Rng.hashString("car"))
    assert(Rng.hashString("car") != Rng.hashString("cat"))
    assert(Rng.hashString("") == Rng.hashString(""))
  }

  test("pick returns members and rejects empty") {
    val xs = IndexedSeq("a", "b", "c")
    forAllLongs() { k => assert(xs.contains(Rng.pick(xs, k, 1L))) }
    intercept[IllegalArgumentException] { Rng.pick(IndexedSeq.empty[Int], 1L, 1L) }
  }
}
