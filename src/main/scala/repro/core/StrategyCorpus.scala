package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.IntegerType

import scala.util.Random

/** Synthetic stand-in for the OpenML CC-18 corpus of trained pipelines the
  * paper uses to fit its optimization strategies (§5.2; 138 pipelines, 22
  * statistics each, each executed under every physical variant).
  *
  * Pipelines are *constructed* (not trained): random featurizers and random
  * models spanning the paper's observed ranges (Fig. 1) — inputs 2–100+,
  * one-hot widths up to hundreds, tree counts 1–200, depths 1–12. Runtime
  * labels come from measuring our three physical variants on a fixed
  * dataset (see the Fig. 4 bench), exactly like the paper's OpenML runs.
  */
object StrategyCorpus {

  final case class Entry(id: Int, pipeline: Pipeline)

  def randomPipeline(id: Int, rng: Random): Pipeline = {
    val nNum = 1 + rng.nextInt(12)
    val nCat = rng.nextInt(6)
    val scaleOps: Vector[FeatOp] = (0 until nNum).map { i =>
      ScaleOp(s"n$i", rng.nextDouble() * 2 - 1, 0.2 + rng.nextDouble() * 1.8)
    }.toVector
    val catCards = (0 until nCat).map { _ =>
      if (rng.nextDouble() < 0.2) 20 + rng.nextInt(180) else 2 + rng.nextInt(18)
    }
    val oheOps: Vector[FeatOp] = catCards.zipWithIndex.map { case (card, i) =>
      OneHotOp(s"c$i", (0 until card).map(v => s"v$v").toVector)
    }.toVector
    val ops = scaleOps ++ oheOps
    val width = ops.map(_.width).sum
    val isBinary: Array[Boolean] = {
      val f = new Array[Boolean](width)
      var off = 0
      ops.foreach { op =>
        op match {
          case _: OneHotOp => (0 until op.width).foreach(k => f(off + k) = true)
          case _           => ()
        }
        off += op.width
      }
      f
    }

    def randomTree(depth: Int, leafLo: Double, leafHi: Double): TreeNode =
      if (depth == 0 || rng.nextDouble() < 0.1)
        Leaf(leafLo + rng.nextDouble() * (leafHi - leafLo))
      else {
        val f = rng.nextInt(width)
        val t = if (isBinary(f)) 0.5 else rng.nextDouble() * 4 - 2
        Split(f, t, randomTree(depth - 1, leafLo, leafHi), randomTree(depth - 1, leafLo, leafHi))
      }

    val model: Model = rng.nextInt(4) match {
      case 0 => // sparse linear
        val w = Vector.fill(width)(if (rng.nextDouble() < 0.5) 0.0 else rng.nextDouble() * 2 - 1)
        LinearModel(w, rng.nextDouble() - 0.5)
      case 1 =>
        TreeEnsembleModel(Vector(randomTree(2 + rng.nextInt(9), 0.0, 1.0)),
          EnsembleKind.SingleTree, width)
      case 2 =>
        val n = 5 + rng.nextInt(30)
        val d = 2 + rng.nextInt(7)
        TreeEnsembleModel(Vector.fill(n)(randomTree(d, 0.0, 1.0)),
          EnsembleKind.RandomForest, width)
      case _ =>
        val n = 10 + rng.nextInt(190)
        val d = 1 + rng.nextInt(7)
        TreeEnsembleModel(Vector.fill(n)(randomTree(d, -0.3, 0.3)),
          EnsembleKind.GradientBoosting(rng.nextDouble() - 0.5), width)
    }
    Pipeline(ops, model)
  }

  def generate(n: Int, seed: Long = 2022): Seq[Entry] = {
    val rng = new Random(seed)
    (0 until n).map(i => Entry(i, randomPipeline(i, rng)))
  }

  /** Input data matching a corpus pipeline's schema. */
  def dataFor(spark: SparkSession, p: Pipeline, rows: Long, seed: Long = 5): DataFrame = {
    var df = spark.range(rows).toDF("id")
    p.ops.zipWithIndex.foreach { case (op, i) =>
      op match {
        case ScaleOp(c, _, _)  => df = df.withColumn(c, rand(seed + i) * 4 - 2)
        case PassThroughOp(c)  => df = df.withColumn(c, rand(seed + i) * 4 - 2)
        case OneHotOp(c, cats) =>
          df = df.withColumn(c, concat(lit("v"), (rand(seed + i) * cats.size).cast(IntegerType)))
      }
    }
    df.drop("id")
  }
}
