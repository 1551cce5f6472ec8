package repro.storage

import java.io.{BufferedOutputStream, DataInputStream, DataOutputStream, EOFException, FileInputStream, FileOutputStream}
import java.nio.file.{Files, Path}

/** One logged update request (§4.4: "all update requests between adjacent
  * snapshots are collected into a WAL").
  */
sealed trait WalEntry
final case class WalInsert(vid: Long, vec: Array[Float]) extends WalEntry
final case class WalDelete(vid: Long) extends WalEntry

/** Append-only write-ahead log of user-facing updates. Binary layout per
  * entry: tag byte (0 insert / 1 delete), vid, and for inserts the float
  * payload. `sync` flushes after every append so a crash truncates at an
  * entry boundary at worst; a torn trailing entry is dropped on replay.
  */
final class Wal(path: Path) extends AutoCloseable {
  private val out = new DataOutputStream(
    new BufferedOutputStream(new FileOutputStream(path.toFile, /*append=*/ true)))

  def logInsert(vid: Long, vec: Array[Float]): Unit = {
    out.writeByte(0)
    out.writeLong(vid)
    out.writeInt(vec.length)
    vec.foreach(out.writeFloat)
    out.flush()
  }

  def logDelete(vid: Long): Unit = {
    out.writeByte(1)
    out.writeLong(vid)
    out.flush()
  }

  override def close(): Unit = out.close()
}

object Wal {

  /** Replay a WAL file in append order; a torn final record (mid-crash
    * write) is silently dropped.
    */
  def replay(path: Path): Seq[WalEntry] = {
    if (!Files.exists(path)) return Seq.empty
    val in = new DataInputStream(new FileInputStream(path.toFile))
    val out = Seq.newBuilder[WalEntry]
    try {
      while (true) {
        in.readByte() match {
          case 0 =>
            val vid = in.readLong()
            val n = in.readInt()
            out += WalInsert(vid, Array.fill(n)(in.readFloat()))
          case 1 =>
            out += WalDelete(in.readLong())
          case t =>
            throw new IllegalStateException(s"corrupt WAL tag $t in $path")
        }
      }
    } catch {
      case _: EOFException => // normal termination (or torn tail)
    } finally in.close()
    out.result()
  }

  /** Delete the log — done once a newer snapshot covers it (§4.4). */
  def truncate(path: Path): Unit = Files.deleteIfExists(path)
}
