package repro.core.hcube

import org.apache.spark.{HashPartitioner, Partitioner}
import org.apache.spark.rdd.RDD

/** A relation participating in a one-round join: positional Long tuples plus
  * the global attribute id of each column.
  *
  * @param name  display name
  * @param attrs global attribute ids, parallel to tuple columns
  * @param rdd   the tuples
  * @param size  tuple count (used by the shares optimizer / cost model)
  */
final case class Rel(name: String, attrs: Vector[Int], rdd: RDD[Array[Long]], size: Long)

/** One-round HCube shuffle (Afrati–Ullman / Beame–Koutris–Suciu [12], [13]).
  *
  * The join output space is divided into Π p_i hypercubes; each input tuple
  * is replicated to every hypercube whose coordinate matches the tuple's
  * attribute hashes on the tuple's own attributes. One Spark partition hosts
  * exactly one hypercube, so the per-partition Leapfrog emits every output
  * tuple exactly once (an output's coordinate is fully determined by its
  * attribute hashes).
  */
object HCube {

  /** 64-bit mix then bucket — cheap, well-spread attribute hash. */
  def hash(value: Long, buckets: Int): Int = {
    if (buckets == 1) return 0
    var h = value * -7046029254386353131L
    h ^= h >>> 32
    (java.lang.Math.floorMod(h, buckets.toLong)).toInt
  }

  private final class CubePartitioner(cubes: Int) extends Partitioner {
    def numPartitions: Int = cubes
    def getPartition(key: Any): Int = key.asInstanceOf[Int]
  }

  /** Linearized cube ids a tuple of relation `attrs` must reach under `p`. */
  def cubesFor(attrs: Vector[Int], tuple: Array[Long], p: Array[Int]): Seq[Int] = {
    val n = p.length
    val coord = Array.fill(n)(-1)
    var i = 0
    while (i < attrs.length) { coord(attrs(i)) = hash(tuple(i), p(attrs(i))); i += 1 }
    // Mixed-radix linearization over free dimensions.
    var ids = List(0)
    var a = 0
    while (a < n) {
      val pa = p(a)
      ids =
        if (coord(a) >= 0) ids.map(_ * pa + coord(a))
        else ids.flatMap(id => (0 until pa).map(id * pa + _))
      a += 1
    }
    ids
  }

  /** Tuple-wise ("Push") shuffle: one shuffle record per (cube, tuple) copy.
    * Returns an RDD keyed by cube id with exactly `Π p` partitions, carrying
    * (relation index, tuple).
    */
  def shufflePush(rels: Seq[Rel], p: Array[Int]): RDD[(Int, (Int, Array[Long]))] = {
    val cubes = p.product
    val rdds = rels.zipWithIndex.map { case (rel, ri) =>
      val attrs = rel.attrs
      val pb    = p // serialized into the closure
      rel.rdd.flatMap(t => cubesFor(attrs, t, pb).map(c => (c, (ri, t))))
    }
    rdds.reduce(_ union _).partitionBy(new CubePartitioner(cubes))
  }

  /** Block-wise ("Pull") shuffle (Sec. V): tuples of one relation headed for
    * one cube are grouped into a single block before crossing the wire, so
    * the shuffle moves O(#blocks) records instead of O(#tuple copies).
    */
  def shufflePull(rels: Seq[Rel], p: Array[Int]): RDD[(Int, (Int, Array[Array[Long]]))] = {
    val cubes = p.product
    val rdds = rels.zipWithIndex.map { case (rel, ri) =>
      val attrs = rel.attrs
      val pb    = p
      rel.rdd
        .mapPartitions { it =>
          // Group locally per (cube) to form blocks.
          val buf = collection.mutable.HashMap.empty[Int, collection.mutable.ArrayBuffer[Array[Long]]]
          it.foreach { t =>
            cubesFor(attrs, t, pb).foreach { c =>
              buf.getOrElseUpdate(c, collection.mutable.ArrayBuffer.empty) += t
            }
          }
          buf.iterator.map { case (c, ts) => (c, (ri, ts.toArray)) }
        }
    }
    rdds.reduce(_ union _).partitionBy(new CubePartitioner(cubes))
  }

  /** Round-robin repartitioner used by the α-calibration harness. */
  def calibrationPartitioner(parts: Int): Partitioner = new HashPartitioner(parts)
}
