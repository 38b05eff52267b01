package repro.datasource

import java.io.{DataInputStream, DataOutputStream}
import repro.core.CoreModel
import repro.esklsh.{ESKLSH, SortedKeyArray}
import repro.lsh.RandomHyperplaneLSH
import repro.rmi.{KeyRescaler, LinearModel, SimplifiedRMI}

/** Binary on-disk format of one core model — the per-cluster index files
  * the LIDER DataSource V2 reads. A custom explicit codec (not Java
  * serialization) so the format is stable, compact and readable from a
  * `PartitionReader` without any Spark machinery.
  *
  * Layout (big-endian, via DataOutputStream):
  *   magic "LIDR", version, n, dim, H, M, b, r0, rescaleKeys,
  *   vectors (n·dim floats), globalIds (n longs),
  *   hyperplanes (H·M·dim floats),
  *   per array: keys (n longs), ids (n ints),
  *   per array: rescaler (min, max, len),
  *   per array: RMI (root a/b, W, leaves a/b, n)
  */
object CoreModelCodec {
  private val Magic = 0x4C494452 // "LIDR"
  private val Version = 1

  def write(cm: CoreModel, out: DataOutputStream): Unit = {
    val n = cm.size
    val lsh = cm.esklsh.lsh
    out.writeInt(Magic); out.writeInt(Version)
    out.writeInt(n); out.writeInt(lsh.dim)
    out.writeInt(lsh.numKeys); out.writeInt(lsh.keyLen)
    out.writeInt(cm.esklsh.b); out.writeInt(cm.r0)
    out.writeBoolean(cm.rescaleKeys)

    var i = 0
    while (i < n) {
      val v = cm.vectors(i)
      var j = 0
      while (j < v.length) { out.writeFloat(v(j)); j += 1 }
      i += 1
    }
    i = 0
    while (i < n) { out.writeLong(cm.globalIds(i)); i += 1 }

    var h = 0
    while (h < lsh.numKeys) {
      var m = 0
      while (m < lsh.keyLen) {
        val p = lsh.planes(h)(m)
        var j = 0
        while (j < p.length) { out.writeFloat(p(j)); j += 1 }
        m += 1
      }
      h += 1
    }

    h = 0
    while (h < lsh.numKeys) {
      val arr = cm.esklsh.arrays(h)
      i = 0
      while (i < n) { out.writeLong(arr.key(i)); i += 1 }
      i = 0
      while (i < n) { out.writeInt(arr.ids(i)); i += 1 }
      h += 1
    }

    h = 0
    while (h < lsh.numKeys) {
      val rs = cm.rescalers(h)
      out.writeLong(rs.min); out.writeLong(rs.max); out.writeLong(rs.arrayLen)
      h += 1
    }

    h = 0
    while (h < lsh.numKeys) {
      val rmi = cm.rmis(h)
      out.writeDouble(rmi.root.slope); out.writeDouble(rmi.root.intercept)
      out.writeInt(rmi.leaves.length)
      rmi.leaves.foreach { l => out.writeDouble(l.slope); out.writeDouble(l.intercept) }
      out.writeLong(rmi.n)
      h += 1
    }
  }

  def read(in: DataInputStream): CoreModel = {
    require(in.readInt() == Magic, "not a LIDER core-model file")
    require(in.readInt() == Version, "unsupported core-model version")
    val n = in.readInt(); val dim = in.readInt()
    val numKeys = in.readInt(); val keyLen = in.readInt()
    val b = in.readInt(); val r0 = in.readInt()
    val rescaleKeys = in.readBoolean()

    val vectors = Array.fill(n) {
      val v = new Array[Float](dim)
      var j = 0
      while (j < dim) { v(j) = in.readFloat(); j += 1 }
      v
    }
    val globalIds = Array.fill(n)(in.readLong())

    val planes = Array.fill(numKeys, keyLen) {
      val p = new Array[Float](dim)
      var j = 0
      while (j < dim) { p(j) = in.readFloat(); j += 1 }
      p
    }
    val lsh = RandomHyperplaneLSH.fromPlanes(planes)

    val arrays = Array.fill(numKeys) {
      val keys = Array.fill(n)(in.readLong())
      val ids = Array.fill(n)(in.readInt())
      SortedKeyArray.fromSorted(keys, ids, keyLen)
    }
    val rescalers = Array.fill(numKeys)(KeyRescaler(in.readLong(), in.readLong(), in.readLong()))
    val rmis = Array.fill(numKeys) {
      val root = LinearModel(in.readDouble(), in.readDouble())
      val w = in.readInt()
      val leaves = Array.fill(w)(LinearModel(in.readDouble(), in.readDouble()))
      SimplifiedRMI(root, leaves, in.readLong())
    }

    new CoreModel(vectors, globalIds, new ESKLSH(lsh, arrays, b), rescalers, rmis, r0, rescaleKeys)
  }
}
