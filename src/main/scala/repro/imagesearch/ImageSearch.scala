package repro.imagesearch

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.{VecRow, VectorData}
import repro.baselines.{AnnIndex, AnnMethod}
import repro.core.Metrics

/** The image-retrieval experiment of Sec. 5.5 (Table 6): multi-descriptor
  * kANN + Borda-count aggregation, evaluated with image-level MAP@5.
  *
  * The Yorck SURF corpus is replaced by a synthetic equivalent: every
  * database image is a cluster of `descPerImage` descriptors around its own
  * center; a query image is a *distorted copy* of a database image (its
  * descriptors re-drawn with extra noise), so the linear-scan ground truth
  * ranks the source image first and structurally similar images next —
  * exactly the retrieval task the paper's experiment exercises.
  */
object ImageSearch {

  final case class Config(nImages: Int = 150, descPerImage: Int = 40, dim: Int = 64,
                          nQueryImages: Int = 20, k: Int = 100, seed: Long = 31)

  final case class Corpus(cfg: Config, spec: VectorData.Spec,
                          descriptors: Array[Array[Float]],
                          queryImages: Array[Array[Array[Float]]],
                          sourceImage: Array[Int]) {
    def imageOf(descId: Long): Int = (descId / cfg.descPerImage).toInt
  }

  /** Deterministic synthetic corpus. Descriptor id = img·descPerImage + j. */
  def corpus(cfg: Config = Config()): Corpus = {
    val rng = new java.util.Random(cfg.seed)
    val centers = Array.fill(cfg.nImages)(Array.fill(cfg.dim)(rng.nextGaussian().toFloat))
    def descriptor(img: Int): Array[Float] =
      centers(img).map(c => (c + rng.nextGaussian() * 0.3).toFloat)
    val descriptors = Array.tabulate(cfg.nImages * cfg.descPerImage)(i => descriptor(i / cfg.descPerImage))
    val sourceImage = Array.tabulate(cfg.nQueryImages)(q => (q * 7) % cfg.nImages)
    val queryImages = sourceImage.map { img =>
      Array.tabulate(cfg.descPerImage) { j =>
        descriptors(img * cfg.descPerImage + j).map(x => (x + rng.nextGaussian() * 0.1).toFloat)
      }
    }
    // a spec describing the descriptor "dataset" for AnnMethod.build
    val spec = VectorData.Spec("imagedesc", cfg.dim, descriptors.length, descriptors.length,
      -8, 8, integerValued = false, nClusters = cfg.nImages, stdFrac = 0.05,
      nQueries = 1, omega = 16, tau = 8, seed = cfg.seed)
    Corpus(cfg, spec, descriptors, queryImages, sourceImage)
  }

  def descriptorDs(spark: SparkSession, c: Corpus): Dataset[VecRow] = {
    import spark.implicits._
    spark.createDataset(c.descriptors.toSeq.zipWithIndex.map { case (v, i) => VecRow(i.toLong, v) })
  }

  /** Image-level top-5 lists for every query image under one built index. */
  def imageRankings(c: Corpus, idx: AnnIndex, topK: Int = 5): Array[Seq[Int]] =
    c.queryImages.map { qDescs =>
      val lists = qDescs.toSeq.map(q => idx.search(q, c.cfg.k).map(_._1).toSeq)
      Borda.topImages(lists, c.imageOf, c.cfg.k, topK)
    }

  /** MAP@5 of a method's image rankings against the ground-truth rankings. */
  def imageMap(truth: Array[Seq[Int]], got: Array[Seq[Int]], topK: Int = 5): Double =
    Metrics.mapAtK(truth.indices.map(i =>
      (truth(i).map(_.toLong), got(i).map(_.toLong))), topK)

  /** Run the whole experiment for a set of methods; returns
    * (method name, image MAP@5, mean per-descriptor query ms).
    */
  def run(spark: SparkSession, c: Corpus, methods: Seq[AnnMethod],
          truthIndex: AnnIndex): Seq[(String, Double, Double)] = {
    val truth = imageRankings(c, truthIndex)
    methods.map { m =>
      val idx = m.build(spark, c.spec, descriptorDs(spark, c), c.descriptors)
      val t0 = System.nanoTime()
      val got = imageRankings(c, idx)
      val perDescMs = (System.nanoTime() - t0) / 1e6 /
        (c.queryImages.length.toLong * c.cfg.descPerImage)
      (idx.name, imageMap(truth, got), perDescMs)
    }
  }
}
