package repro.baselines.genetic

import scala.util.Random
import org.apache.spark.sql.SparkSession
import repro.core.{Cells, FileGrid, Geometry, Segmentation}
import repro.core.Geometry.Rect
import repro.corpus.SpreadsheetGen.{GoldFile, Role}

/** The genetic-based table recognition baseline (Koci et al., §5.2).
  *
  * Two supervised steps, both implemented from scratch:
  *  1. a random-forest cell classifier labels every non-empty cell with its
  *     role (data / header / metadata) from content+position features —
  *     plus style features (bold) in the XLS variant, which the CSV variant
  *     drops, simulating a .csv input as in the paper;
  *  2. neighboring same-label cells are grouped into vertices of a graph
  *     whose edges connect spatially close vertices; a genetic algorithm
  *     searches edge cut sets — regions are the connected components of the
  *     kept edges — maximizing a fitness rewarding dense, role-coherent,
  *     header-topped regions.
  *
  * Trained and evaluated with k-fold cross-validation per dataset, as in
  * the paper's setup.
  */
object GeneticTableRec {

  /** Baseline variant: XLS sees synthetic style features, CSV does not. */
  final case class Config(useStyle: Boolean, folds: Int = 10, seed: Long = 11,
                          population: Int = 24, generations: Int = 30,
                          maxCellsPerFold: Int = 40000)

  // ----------------------------------------------------------- features

  /** Content + position (+ style) features of one cell. */
  def features(f: GoldFile, x: Int, y: Int, useStyle: Boolean): Array[Double] = {
    val v = f.rows(y)(x)
    val t = Cells.synType(v)
    val letters = v.count(_.isLetter)
    val digits  = v.count(_.isDigit)
    val base = Array[Double](
      v.length.toDouble,
      if (v.isEmpty) 0.0 else digits.toDouble / v.length,
      if (v.isEmpty) 0.0 else letters.toDouble / v.length,
      if (letters == 0) 0.0 else v.count(_.isUpper).toDouble / letters,
      t.code.toDouble,
      x.toDouble,
      y.toDouble,
      if (y == 0) 1.0 else 0.0,
      v.count(_ == ' ').toDouble,
    )
    if (useStyle) base :+ (if (f.bold(y)(x)) 1.0 else 0.0) else base
  }

  /** Role labels used by the classifier (empty cells are not classified). */
  val NClasses = 3
  def labelOf(role: Byte): Int = role match {
    case Role.Data => 0
    case Role.Header => 1
    case _ => 2
  }

  /** Cross-validated cell classification: returns, per file, the predicted
    * role of every non-empty cell. Folds are split by file so that a file
    * is never classified by a forest that saw it.
    */
  def classifyCells(files: Vector[GoldFile], cfg: Config): Map[String, Map[(Int, Int), Int]] = {
    import scala.concurrent.{Await, Future}
    import scala.concurrent.ExecutionContext.Implicits.global
    import scala.concurrent.duration.Duration
    val rnd = new Random(cfg.seed)
    val shuffled = rnd.shuffle(files)
    val folds = shuffled.zipWithIndex.groupBy(_._2 % cfg.folds).view.mapValues(_.map(_._1)).toMap
    // folds are independent: train and predict them concurrently
    val futures = (0 until cfg.folds).map { fold =>
      Future {
        val test = folds.getOrElse(fold, Vector.empty)
        if (test.isEmpty) Vector.empty[(String, Map[(Int, Int), Int])]
        else {
          val train = (0 until cfg.folds).filter(_ != fold).flatMap(folds.getOrElse(_, Vector.empty))
          val insts = train.flatMap { f =>
            for {
              y <- f.rows.indices
              x <- f.rows(y).indices
              if f.rows(y)(x).nonEmpty
            } yield DecisionForest.Instance(features(f, x, y, cfg.useStyle), labelOf(f.roles(y)(x)))
          }
          val sample =
            if (insts.size <= cfg.maxCellsPerFold) insts.toIndexedSeq
            else { val r2 = new Random(cfg.seed + fold); IndexedSeq.fill(cfg.maxCellsPerFold)(insts(r2.nextInt(insts.size))) }
          val forest = DecisionForest.train(sample, NClasses,
            DecisionForest.Params(seed = cfg.seed * 131 + fold))
          test.map { f =>
            f.fileId -> (for {
              y <- f.rows.indices
              x <- f.rows(y).indices
              if f.rows(y)(x).nonEmpty
            } yield (x, y) -> forest.predict(features(f, x, y, cfg.useStyle))).toMap
          }
        }
      }
    }
    Await.result(Future.sequence(futures), Duration.Inf).flatten.toMap
  }

  // ------------------------------------------------------ genetic search

  /** A vertex: 4-connected group of cells sharing a predicted label. */
  final case class Vertex(box: Rect, label: Int, cells: Int)

  /** Groups same-label 4-connected cells into vertices. */
  def vertices(grid: FileGrid, labels: Map[(Int, Int), Int]): Vector[Vertex] = {
    val seen = scala.collection.mutable.Set.empty[(Int, Int)]
    val out = Vector.newBuilder[Vertex]
    for (((sx, sy), lab) <- labels.toVector.sortBy { case ((x, y), _) => (y, x) } if !seen((sx, sy))) {
      val stack = scala.collection.mutable.ArrayDeque((sx, sy))
      val comp = Vector.newBuilder[(Int, Int)]
      seen += ((sx, sy))
      while (stack.nonEmpty) {
        val (cx, cy) = stack.removeLast()
        comp += ((cx, cy))
        for ((nx, ny) <- Seq((cx - 1, cy), (cx + 1, cy), (cx, cy - 1), (cx, cy + 1)))
          if (!seen((nx, ny)) && labels.get((nx, ny)).contains(lab)) {
            seen += ((nx, ny)); stack.append((nx, ny))
          }
      }
      val cs = comp.result()
      val xs = cs.map(_._1); val ys = cs.map(_._2)
      out += Vertex(Rect(xs.min, ys.min, xs.max, ys.max), lab, cs.size)
    }
    out.result()
  }

  /** Candidate edges connect vertices whose boxes are within distance 2. */
  def candidateEdges(vs: Vector[Vertex]): Vector[(Int, Int)] =
    (for {
      i <- vs.indices; j <- (i + 1) until vs.length
      if Geometry.distance(vs(i).box, vs(j).box) <= 2.0
    } yield (i, j)).toVector

  /** Fitness of a partition (regions = kept-edge components).
    *
    * Area-weighted: each group contributes its covered non-empty cells
    * minus the empty cells its bounding box swallows (normalized by the
    * file's non-empty total), so splitting a coherent table yields no
    * density windfall; a small per-group penalty rewards merging across
    * small gaps while the swallowed-empty term vetoes merging across the
    * wide gaps that separate independent regions. Header-above-data and
    * not mixing metadata with table content are rewarded per group.
    */
  def fitness(grid: FileGrid, vs: Vector[Vertex], groups: Vector[Vector[Int]]): Double = {
    val cells = grid.nonEmptyCells
    val total = math.max(1, cells.size)
    // average cells per occupied row: the cost of swallowing one empty row
    val rowFill = total.toDouble / math.max(1, cells.map(_._2).distinct.size)
    // per-group penalty between one and two swallowed rows: merging across
    // a single empty row pays off, merging across wider gaps does not
    val groupPenalty = 1.5 * rowFill
    var score = 0.0
    for (g <- groups) {
      val boxes = g.map(vs(_).box)
      val box = Geometry.boundary(boxes)
      val nonEmpty = box.cells.count { case (x, y) =>
        x < grid.width && y < grid.height && !Cells.isEmpty(grid.cell(x, y))
      }
      val swallowedEmpty = box.area - nonEmpty
      val hasData = g.exists(vs(_).label == 0)
      val hasMeta = g.exists(vs(_).label == 2)
      val headerOk = g.filter(vs(_).label == 1).forall { h =>
        g.filter(vs(_).label == 0).forall(d => vs(h).box.y0 <= vs(d).box.y0)
      }
      score += (nonEmpty - swallowedEmpty).toDouble +
        (if (headerOk) 0.2 * rowFill else -0.2 * rowFill) +
        (if (hasData && hasMeta) -0.5 * rowFill else 0.0)
    }
    score - groupPenalty * groups.size
  }

  /** Genetic search over edge cut sets for one file. */
  def recognize(grid: FileGrid, labels: Map[(Int, Int), Int], cfg: Config, runSeed: Long): Vector[Rect] = {
    val vs = vertices(grid, labels)
    if (vs.isEmpty) return Vector.empty
    val edges = candidateEdges(vs)
    if (edges.isEmpty) return vs.map(_.box)
    val rnd = new Random(runSeed)

    def groupsOf(genome: Array[Boolean]): Vector[Vector[Int]] = {
      val parent = Array.tabulate(vs.length)(identity)
      def find(a: Int): Int = { var r = a; while (parent(r) != r) r = parent(r); parent(a) = r; r }
      for (((i, j), k) <- edges.zipWithIndex if genome(k)) {
        val (ri, rj) = (find(i), find(j)); if (ri != rj) parent(ri) = rj
      }
      vs.indices.groupBy(find).values.map(_.toVector).toVector
    }
    def eval(genome: Array[Boolean]): Double = fitness(grid, vs, groupsOf(genome))

    var pop = Vector.fill(cfg.population)(Array.fill(edges.length)(rnd.nextDouble() < 0.7))
    var scores = pop.map(eval)
    for (_ <- 0 until cfg.generations) {
      val next = scala.collection.mutable.ArrayBuffer.empty[Array[Boolean]]
      // elitism: keep the two best
      val order = scores.zipWithIndex.sortBy(-_._1).map(_._2)
      next += pop(order(0)).clone(); next += pop(order(1)).clone()
      while (next.size < cfg.population) {
        def pick(): Array[Boolean] = { // tournament of 3
          val c = Vector.fill(3)(rnd.nextInt(pop.size))
          pop(c.maxBy(scores))
        }
        val a = pick(); val b = pick()
        val child = Array.tabulate(edges.length)(k => if (rnd.nextBoolean()) a(k) else b(k))
        for (k <- edges.indices) if (rnd.nextDouble() < 0.03) child(k) = !child(k)
        next += child
      }
      pop = next.toVector
      scores = pop.map(eval)
    }
    val best = pop(scores.indices.maxBy(scores))
    groupsOf(best).map(g => Geometry.boundary(g.map(vs(_).box)))
  }

  /** Full baseline over a corpus: CV cell classification, then per-file
    * genetic recognition parallelized on Spark.
    */
  def detect(spark: SparkSession, files: Vector[GoldFile], cfg: Config, runSeed: Long = 0): Map[String, Vector[Rect]] = {
    val labels = classifyCells(files, cfg)
    val bc = spark.sparkContext.broadcast(labels)
    spark.sparkContext
      .parallelize(files, math.min(files.size, spark.sparkContext.defaultParallelism * 4))
      .map { f =>
        f.fileId -> recognize(f.grid, bc.value.getOrElse(f.fileId, Map.empty), cfg,
          runSeed * 1013904223L + f.fileId.hashCode)
      }
      .collect()
      .toMap
  }
}
