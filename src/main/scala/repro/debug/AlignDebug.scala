package repro.debug

import repro.bench._
import repro.core._
import repro.data.DatasetSpec
import repro.embed.ClipSim
import repro.store.LocalVectorStore

/** Scratch diagnostic for the query-aligner behaviour (not part of the
  * reproduction surface; run via `sbt "runMain repro.debug.AlignDebug"`).
  */
object AlignDebug {
  def main(args: Array[String]): Unit = {
    val spec = DatasetSpec(
      name = "tiny", nImages = 20000, imgW = 448, imgH = 448,
      nCats = 12, nBg = 10, catZipfAlpha = 0.5,
      minObjPerImage = 1, maxObjPerImage = 3,
      objScaleRange = (0.2, 0.5), centered = false,
      deficitGoodFrac = 0.5, deficitGoodRange = (0.0, 0.3),
      deficitBadRange = (0.6, 1.8), localitySplitFrac = 0.1,
      instanceNoise = 0.3, regionNoise = 0.05, clutterConcepts = 3,
      dim = 64, seed = 101)
    val sf = 0.01
    val user = new SimulatedUser(spec, sf)
    val store = LocalVectorStore.build(spec, sf, multiscale = true)
    val cs = spec.conceptSpace

    for (cat <- user.queryCategories) {
      val proto = cs.catProto(cat)
      val q0 = user.textEmbedding(cat)
      val zs = SearchSession.run(store, user, cat, MethodConfig.ZeroShot, multiscale = true)
      val fs = SearchSession.run(store, user, cat, MethodConfig.FewShot, multiscale = true)
      val qa = SearchSession.run(store, user, cat, MethodConfig.QueryAlign, multiscale = true)

      // Re-create the few-shot learned vector from the zero-shot trace prefix.
      val seenIds = {
        var q = q0
        val seen = scala.collection.mutable.ArrayBuffer.empty[Long]
        val ex = scala.collection.mutable.ArrayBuffer.empty[Example]
        for (_ <- 0 until 15) {
          val h = store.topImages(q, 1, seen.toSet).head
          seen += h.imgId
          ex ++= user.labelPatches(ClipSim.patchRecords(spec, user.meta(h.imgId), multiscale = true), cat)
          q = QueryAligner.align(q0, ex.toIndexedSeq, AlignerConfig.FewShot)
        }
        (seen.toSeq, ex.toIndexedSeq, q)
      }
      val (_, examples, wFew) = seenIds
      val pos = examples.filter(_.positive).map(_.vec)
      val neg = examples.filterNot(_.positive).map(_.vec)
      val posMean = if (pos.nonEmpty) Linalg.mean(pos) else new Array[Float](spec.dim)
      val negMean = if (neg.nonEmpty) Linalg.mean(neg) else new Array[Float](spec.dim)
      // Raw (unnormalized) solutions to inspect equilibrium |w| and loss scales.
      def rawSolve(cfg: AlignerConfig): Array[Double] = {
        val loss = new LossFunction(q0, examples, cfg.lambda, cfg.lambdaC, 0.0, None)
        LBFGS.minimize(loss, Linalg.toDouble(Linalg.normalize(q0)), maxIters = 80, gradTol = 1e-5).x
      }
      val wQaRaw = rawSolve(AlignerConfig.QueryAlign)
      val wQa = Linalg.toFloat(Linalg.normalizeD(wQaRaw))
      val lossFs = new LossFunction(q0, examples, 100.0, 0.0, 0.0, None)
      val dataAtQa = lossFs.valueAndGradient(wQaRaw)._1

      println(f"cat=$cat%2d d=${cs.alignmentDeficit(cat)}%.2f R=${user.totalRelevant(cat)}%3d " +
        f"zsAP=${zs.ap}%.2f fsAP=${fs.ap}%.2f qaAP=${qa.ap}%.2f | " +
        f"pos=${pos.size}%3d neg=${neg.size}%4d " +
        f"cos(wFs,proto)=${Linalg.cosine(wFew, proto)}%.2f " +
        f"cos(wQa,proto)=${Linalg.cosine(wQa, proto)}%.2f cos(wQa,q0)=${Linalg.cosine(wQa, q0)}%.2f " +
        f"cos(q0,proto)=${Linalg.cosine(q0, proto)}%.2f |wQaRaw|=${Linalg.normD(wQaRaw)}%.3f dataLoss=${dataAtQa}%.1f")
    }
  }
}
