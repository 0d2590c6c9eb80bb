package repro

import repro.data.DatasetSpec

/** Small deterministic dataset specs shared by the unit tests (dim=64,
  * tiny image counts — see DESIGN.md §6).
  */
object TestData {

  /** 448x448 images (1 coarse + 9 fine patches — the paper's example). */
  def tiny(name: String = "tiny", dim: Int = 64, seed: Long = 101): DatasetSpec = DatasetSpec(
    name = name, nImages = 20000, imgW = 448, imgH = 448,
    nCats = 12, nBg = 10, catZipfAlpha = 0.5,
    minObjPerImage = 1, maxObjPerImage = 3,
    objScaleRange = (0.2, 0.5), centered = false,
    deficitGoodFrac = 0.5, deficitGoodRange = (0.0, 0.3),
    deficitBadRange = (0.6, 1.8), localitySplitFrac = 0.1,
    instanceNoise = 0.3, regionNoise = 0.05, clutterConcepts = 3,
    dim = dim, seed = seed,
  )

  /** ObjectNet-style: 224x224, single centered object, coarse-only. */
  def tinyCentered(dim: Int = 64, seed: Long = 202): DatasetSpec =
    tiny("tinyCentered", dim, seed).copy(
      imgW = 224, imgH = 224,
      minObjPerImage = 1, maxObjPerImage = 1,
      objScaleRange = (0.6, 0.9), centered = true,
    )

  /** Minimum-size corpus (50 images) for oracle round-trips. */
  val OracleSf = 0.001

  /** ~200-image corpus for behavioural tests. */
  val SmallSf = 0.01
}
