package repro.bench

import repro.core.Example
import repro.data.{DatasetSpec, ImageCorpus, ImageMeta}
import repro.embed.{Box, PatchRecord}

/** Ground-truth-driven feedback provider (paper §5.1, "Zero-shot CLIP
  * results"): the benchmark stands in for the human — it decides relevance
  * from dataset labels and returns the labeled object boxes as region
  * feedback. Patches overlapping a ground-truth box of the query category
  * are positives; patches with no overlap are negatives (§4.3).
  *
  * Serializable for use inside query-parallel Spark sweeps; ground truth is
  * deterministic in (spec, sf) so it is rebuilt lazily on executors instead
  * of being shipped.
  */
final class SimulatedUser(val spec: DatasetSpec, val sf: Double) extends Serializable {

  @transient private lazy val metas: IndexedSeq[ImageMeta] = ImageCorpus.metasLocal(spec, sf)

  @transient private lazy val relevantCount: Map[Int, Long] =
    metas.iterator
      .flatMap(_.objects.map(_.cat).distinct)
      .toSeq
      .groupBy(identity)
      .map { case (c, xs) => c -> xs.size.toLong }

  def nImages: Int = metas.length

  def meta(imgId: Long): ImageMeta = metas(imgId.toInt)

  /** Whether the image contains at least one instance of the category. */
  def isRelevant(imgId: Long, cat: Int): Boolean =
    meta(imgId).objects.exists(_.cat == cat)

  /** The user's box annotations: ground-truth boxes of the category. */
  def gtBoxes(imgId: Long, cat: Int): Seq[Box] =
    meta(imgId).objects.filter(_.cat == cat).map(_.box)

  /** Number of relevant images in the whole dataset (the R of the AP metric). */
  def totalRelevant(cat: Int): Long = relevantCount.getOrElse(cat, 0L)

  /** Categories usable as benchmark queries (≥ 1 relevant image). */
  def queryCategories: Seq[Int] = (0 until spec.nCats).filter(totalRelevant(_) > 0)

  /** The initial text query vector for a category. */
  def textEmbedding(cat: Int): Array[Float] = spec.conceptSpace.textEmbedding(cat)

  /** Label an image's patches from the user's box feedback. */
  def labelPatches(patches: Seq[PatchRecord], cat: Int): Seq[Example] = {
    require(patches.nonEmpty, "no patches to label")
    val boxes = gtBoxes(patches.head.imgId, cat)
    patches.map(p => Example(p.vec, boxes.exists(_.overlaps(p.box))))
  }
}
