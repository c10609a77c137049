package repro.linalg

import java.util.concurrent.atomic.AtomicLong

import org.scalatest.funsuite.AnyFunSuite

class ParSpec extends AnyFunSuite {

  test("mapChunks covers the whole range exactly once") {
    val hits = new Array[Int](1000)
    Par.foreachChunk(1000, (lo, hi) => (lo until hi).foreach(i => hits(i) += 1))
    assert(hits.forall(_ == 1))
  }

  test("mapChunks results come back in chunk order") {
    val res = Par.mapChunks(100, (lo, _) => lo)
    assert(res.toSeq == res.sorted.toSeq)
  }

  test("chunk bounds partition the range") {
    val res = Par.mapChunks(257, (lo, hi) => (lo, hi))
    assert(res.head._1 == 0)
    assert(res.last._2 == 257)
    res.sliding(2).foreach(w => if (w.size == 2) assert(w(0)._2 == w(1)._1))
  }

  test("n = 0 yields no work") {
    assert(Par.mapChunks[Int](0, (_, _) => fail("should not run")).isEmpty)
  }

  test("n = 1 runs a single chunk") {
    assert(Par.mapChunks(1, (lo, hi) => hi - lo).toSeq == Seq(1))
  }

  test("parallel sum matches sequential sum") {
    val total = new AtomicLong()
    Par.foreachChunk(10000, (lo, hi) => {
      var s = 0L; (lo until hi).foreach(s += _); total.addAndGet(s); ()
    })
    assert(total.get == (0L until 10000L).sum)
  }

  test("exceptions in workers propagate") {
    intercept[Exception] {
      Par.mapChunks(100, (lo, _) => if (lo >= 0) throw new IllegalStateException("boom") else 0)
    }
  }
}
