package repro.store

import repro.core.Linalg
import repro.data.{DatasetSpec, ImageCorpus}
import repro.embed.{Box, ClipSim, PatchRecord}

/** In-memory vector store over flat arrays.
  *
  * This is the store broadcast into per-query simulation UDFs (thousands of
  * interactive search loops run against it during the benchmark sweeps) and
  * the exact reference the Spark and LSH stores are tested against. Patches
  * of an image are stored contiguously so the per-image max rule is a single
  * streaming pass.
  */
final class LocalVectorStore(records: IndexedSeq[PatchRecord]) extends VectorStore with Serializable {
  require(records.nonEmpty, "empty store")

  // Sorted by (imgId, patchId) so per-image blocks are contiguous.
  private val sorted = records.sortBy(r => (r.imgId, r.patchId)).toArray
  val vecs: Array[Array[Float]] = sorted.map(_.vec)
  val imgIds: Array[Long] = sorted.map(_.imgId)
  val patchIds: Array[Int] = sorted.map(_.patchId)
  private val boxes: Array[Box] = sorted.map(_.box)

  override val dim: Int = vecs(0).length
  override val nVectors: Long = vecs.length.toLong
  private val imgStart: Map[Long, Int] = {
    val b = Map.newBuilder[Long, Int]
    var i = 0
    while (i < sorted.length) {
      if (i == 0 || imgIds(i) != imgIds(i - 1)) b += imgIds(i) -> i
      i += 1
    }
    b.result()
  }
  override val nImages: Long = imgStart.size.toLong

  /** All patch records of one image, ordered by patchId. */
  def patchesOf(imgId: Long): IndexedSeq[PatchRecord] = {
    val start = imgStart.getOrElse(imgId, sys.error(s"unknown image $imgId"))
    val buf = IndexedSeq.newBuilder[PatchRecord]
    var i = start
    while (i < sorted.length && imgIds(i) == imgId) { buf += sorted(i); i += 1 }
    buf.result()
  }

  /** The patch vector at flat index i (used by graph builders). */
  def vectorAt(i: Int): Array[Float] = vecs(i)

  override def topImages(q: Array[Float], k: Int, exclude: Set[Long]): IndexedSeq[ImageHit] = {
    require(q.length == dim, s"query dim ${q.length} != store dim $dim")
    require(k > 0, "k must be positive")
    // Min-heap of the current top-k; orders worst-first so peek is the bar.
    val heap = scala.collection.mutable.PriorityQueue.empty[ImageHit](
      Ordering.by[ImageHit, (Double, Long)](h => (-h.score, h.imgId)))
    var i = 0
    val n = vecs.length
    while (i < n) {
      val img = imgIds(i)
      if (exclude.contains(img)) {
        while (i < n && imgIds(i) == img) i += 1
      } else {
        var best = Double.NegativeInfinity
        var bestPatch = -1
        while (i < n && imgIds(i) == img) {
          val s = Linalg.dot(vecs(i), q)
          if (s > best) { best = s; bestPatch = patchIds(i) }
          i += 1
        }
        if (heap.size < k) heap.enqueue(ImageHit(img, bestPatch, best))
        else {
          val worst = heap.head
          if (best > worst.score || (best == worst.score && img < worst.imgId)) {
            heap.dequeue(); heap.enqueue(ImageHit(img, bestPatch, best))
          }
        }
      }
    }
    heap.dequeueAll.reverse.toIndexedSeq
  }

  /** Exhaustive image ranking (for AP-oracle tests on small stores). */
  def rankAllImages(q: Array[Float]): IndexedSeq[ImageHit] =
    topImages(q, imgStart.size, Set.empty)
}

object LocalVectorStore {
  /** Build a store for a synthetic corpus directly (no Spark round-trip);
    * bitwise-identical to collecting `ClipSim.patchVectors` because the
    * embedder is a pure function. Embedding is parallelized over images
    * (pure per-image work, deterministic output).
    */
  def build(spec: DatasetSpec, sf: Double, multiscale: Boolean): LocalVectorStore = {
    val metas = ImageCorpus.metasLocal(spec, sf)
    val perImage = new Array[Seq[PatchRecord]](metas.length)
    java.util.stream.IntStream.range(0, metas.length).parallel().forEach { i =>
      perImage(i) = ClipSim.patchRecords(spec, metas(i), multiscale)
    }
    new LocalVectorStore(perImage.toIndexedSeq.flatten)
  }
}
