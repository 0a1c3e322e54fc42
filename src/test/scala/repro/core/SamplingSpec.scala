package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class SamplingSpec extends AnyFunSuite {

  case class C(src: Long, w: Double)
  private def cands(n: Int, seed: Long): Seq[C] = {
    val rng = new Random(seed)
    (0 until n).map(i => C(rng.nextLong().abs, 0.1 + rng.nextDouble()))
  }

  test("NoSampling keeps everything") {
    val cs = cands(17, 1)
    val sel = Sampling.selectInEdges[C](cs, _.src, _.w, NoSampling, 5L, 9L, isHub = false, 4)
    assert(sel.map(_.src).sorted == cs.map(_.src).sorted)
  }

  test("UniformSampling caps the selection") {
    for (n <- Seq(3, 10, 50)) {
      val cs = cands(n, n)
      val sel = Sampling.selectInEdges[C](cs, _.src, _.w, UniformSampling(5), 5L, 9L, isHub = false, 4)
      assert(sel.length == math.min(n, 5))
      assert(sel.toSet.subsetOf(cs.toSet))
    }
  }

  test("selection is deterministic in (seed, node) and order-independent") {
    val cs = cands(30, 2)
    val a = Sampling.selectInEdges[C](cs, _.src, _.w, UniformSampling(7), 5L, 9L, isHub = false, 4)
    val b = Sampling.selectInEdges[C](new Random(0).shuffle(cs.toList), _.src, _.w,
      UniformSampling(7), 5L, 9L, isHub = false, 4)
    assert(a.map(_.src).sorted == b.map(_.src).sorted)
    val c = Sampling.selectInEdges[C](cs, _.src, _.w, UniformSampling(7), 5L, 10L, isHub = false, 4)
    assert(a.map(_.src).sorted != c.map(_.src).sorted || a.length == cs.length)
  }

  test("different seeds generally select different subsets") {
    val cs = cands(40, 3)
    val a = Sampling.selectInEdges[C](cs, _.src, _.w, UniformSampling(10), 1L, 9L, isHub = false, 4)
    val b = Sampling.selectInEdges[C](cs, _.src, _.w, UniformSampling(10), 2L, 9L, isHub = false, 4)
    assert(a.map(_.src).toSet != b.map(_.src).toSet)
  }

  test("TopKSampling keeps the heaviest candidates") {
    val cs = (0 until 10).map(i => C(i.toLong, i.toDouble))
    val sel = Sampling.selectInEdges[C](cs, _.src, _.w, TopKSampling(3), 5L, 9L, isHub = false, 4)
    assert(sel.map(_.w).toSet == Set(9.0, 8.0, 7.0))
  }

  test("WeightedSampling favors heavy candidates in aggregate") {
    // one heavy item among many light ones: should be picked almost always
    val cs = C(999L, 100.0) +: (0 until 20).map(i => C(i.toLong, 0.01))
    val picks = (0 until 200).count { node =>
      Sampling.selectInEdges[C](cs, _.src, _.w, WeightedSampling(3), 5L, node.toLong,
        isHub = false, 4).exists(_.src == 999L)
    }
    assert(picks > 180, s"heavy item picked only $picks/200 times")
  }

  test("hub selection partitions by salt and caps per salt") {
    val cs = cands(200, 4)
    val sel = Sampling.selectInEdges[C](cs, _.src, _.w, UniformSampling(5), 5L, 9L,
      isHub = true, numSalts = 4)
    assert(sel.length <= 4 * 5)
    assert(sel.length >= 5) // at least one salt group is full
    // per-salt determinism: same call gives same result
    val sel2 = Sampling.selectInEdges[C](cs, _.src, _.w, UniformSampling(5), 5L, 9L,
      isHub = true, numSalts = 4)
    assert(sel.map(_.src) == sel2.map(_.src))
  }

  test("hub and non-hub selection agree when nothing is dropped") {
    val cs = cands(6, 5)
    val hub = Sampling.selectInEdges[C](cs, _.src, _.w, NoSampling, 5L, 9L, isHub = true, 4)
    val normal = Sampling.selectInEdges[C](cs, _.src, _.w, NoSampling, 5L, 9L, isHub = false, 4)
    assert(hub.map(_.src).sorted == normal.map(_.src).sorted)
  }

  test("saltOf is stable and in range") {
    for (s <- -5L to 5L; n <- Seq(1, 4, 8)) {
      val v = Sampling.saltOf(s, n)
      assert(v >= 0 && v < n)
      assert(v == Sampling.saltOf(s, n))
    }
  }

  test("rngFor is reproducible") {
    val a = Sampling.rngFor(1, 2, 3).nextLong()
    val b = Sampling.rngFor(1, 2, 3).nextLong()
    val c = Sampling.rngFor(1, 2, 4).nextLong()
    assert(a == b && a != c)
  }
}
