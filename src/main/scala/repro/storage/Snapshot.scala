package repro.storage

import java.io.{BufferedOutputStream, DataInputStream, DataOutputStream, FileInputStream, FileOutputStream}
import java.nio.file.Path

/** A point-in-time image of the index's in-memory structures (§4.4): the
  * centroid index, the Updater's version map, and the Block Controller's
  * block mapping. On-disk posting blocks are NOT copied — the pre-release
  * buffer in [[BlockController]] guarantees the blocks a snapshot references
  * are never overwritten until a newer snapshot lands, so restoring the
  * mapping is enough to roll disk state back.
  */
final case class Snapshot(
    dim: Int,
    nextPid: Long,
    centroids: Map[Long, Array[Float]],
    versions: Map[Long, (Int, Boolean)],
    blockMapping: Map[Long, Vector[Long]],
)

object Snapshot {

  /** Persist to a binary file (the paper flushes ~40 GB in 2–3 s; ours is
    * kilobytes, same structure).
    */
  def write(snap: Snapshot, path: Path): Unit = {
    val out = new DataOutputStream(new BufferedOutputStream(new FileOutputStream(path.toFile)))
    try {
      out.writeInt(snap.dim)
      out.writeLong(snap.nextPid)
      out.writeInt(snap.centroids.size)
      snap.centroids.foreach { case (pid, c) =>
        out.writeLong(pid); out.writeInt(c.length); c.foreach(out.writeFloat)
      }
      out.writeInt(snap.versions.size)
      snap.versions.foreach { case (vid, (ver, del)) =>
        out.writeLong(vid); out.writeInt(ver); out.writeBoolean(del)
      }
      out.writeInt(snap.blockMapping.size)
      snap.blockMapping.foreach { case (pid, blocks) =>
        out.writeLong(pid); out.writeInt(blocks.length); blocks.foreach(out.writeLong)
      }
    } finally out.close()
  }

  /** Load a snapshot previously written by [[write]]. */
  def read(path: Path): Snapshot = {
    val in = new DataInputStream(new FileInputStream(path.toFile))
    try {
      val dim = in.readInt()
      val nextPid = in.readLong()
      val centroids = (1 to in.readInt()).map { _ =>
        val pid = in.readLong()
        val n = in.readInt()
        pid -> Array.fill(n)(in.readFloat())
      }.toMap
      val versions = (1 to in.readInt()).map { _ =>
        in.readLong() -> ((in.readInt(), in.readBoolean()))
      }.toMap
      val blockMapping = (1 to in.readInt()).map { _ =>
        val pid = in.readLong()
        val n = in.readInt()
        pid -> Vector.fill(n)(in.readLong())
      }.toMap
      Snapshot(dim, nextPid, centroids, versions, blockMapping)
    } finally in.close()
  }
}
