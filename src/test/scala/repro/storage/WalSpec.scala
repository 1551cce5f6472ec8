package repro.storage

import java.nio.file.Files

import repro.SparkSpec

/** WAL framing, replay order, truncation, and torn-tail tolerance (§4.4). */
class WalSpec extends SparkSpec {

  private def tmp() = Files.createTempFile("wal", ".bin")

  test("replay of a missing file is empty") {
    val p = tmp(); Files.delete(p)
    assert(Wal.replay(p).isEmpty)
  }

  test("inserts and deletes replay in append order") {
    val p = tmp()
    val w = new Wal(p)
    w.logInsert(1L, Array(1f, 2f))
    w.logDelete(2L)
    w.logInsert(3L, Array(3f))
    w.close()
    val entries = Wal.replay(p)
    entries match {
      case Seq(WalInsert(1L, v1), WalDelete(2L), WalInsert(3L, v3)) =>
        assert(v1.toSeq == Seq(1f, 2f) && v3.toSeq == Seq(3f))
      case other => fail(s"unexpected replay: $other")
    }
  }

  test("reopening appends rather than truncating") {
    val p = tmp()
    val w1 = new Wal(p); w1.logDelete(1L); w1.close()
    val w2 = new Wal(p); w2.logDelete(2L); w2.close()
    assert(Wal.replay(p) == Seq(WalDelete(1L), WalDelete(2L)))
  }

  test("truncate removes the log") {
    val p = tmp()
    val w = new Wal(p); w.logDelete(1L); w.close()
    Wal.truncate(p)
    assert(Wal.replay(p).isEmpty)
  }

  test("a torn trailing record is dropped, prior entries survive") {
    val p = tmp()
    val w = new Wal(p); w.logInsert(1L, Array(1f)); w.close()
    // Simulate a crash mid-write: append half an insert header.
    val out = new java.io.FileOutputStream(p.toFile, true)
    out.write(Array[Byte](0, 0, 0)) // tag + partial vid
    out.close()
    val entries = Wal.replay(p)
    assert(entries.length == 1)
    assert(entries.head.isInstanceOf[WalInsert])
  }

  test("large vectors round-trip") {
    val p = tmp()
    val vec = Array.tabulate(128)(_.toFloat)
    val w = new Wal(p); w.logInsert(9L, vec); w.close()
    Wal.replay(p) match {
      case Seq(WalInsert(9L, v)) => assert(v.toSeq == vec.toSeq)
      case other => fail(s"unexpected: $other")
    }
  }
}
