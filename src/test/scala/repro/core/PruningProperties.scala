package repro.core

import org.scalacheck.{Gen, Prop, Properties}

import scala.util.Random

/** ScalaCheck properties for the optimization rules: soundness of tree
  * pruning under predicate-derived intervals, and semantic preservation of
  * densification + pushdown, over generated trees and pipelines.
  */
object PruningProperties extends Properties("Pruning") {

  private val genLeaf: Gen[TreeNode] = Gen.choose(0.0, 1.0).map(Leaf)

  private def genTree(depth: Int, width: Int): Gen[TreeNode] =
    if (depth == 0) genLeaf
    else
      Gen.frequency(
        1 -> genLeaf,
        4 -> (for {
          f <- Gen.choose(0, width - 1)
          t <- Gen.choose(-2.0, 2.0)
          l <- genTree(depth - 1, width)
          r <- genTree(depth - 1, width)
        } yield Split(f, t, l, r)),
      )

  private val genBounds: Gen[Map[Int, Interval]] =
    Gen.mapOf(for {
      f  <- Gen.choose(0, 4)
      a  <- Gen.choose(-2.5, 2.5)
      b  <- Gen.choose(-2.5, 2.5)
    } yield f -> Interval(math.min(a, b), math.max(a, b)))

  property("pruned tree agrees with original on all in-bounds points") =
    Prop.forAll(genTree(5, 5), genBounds, Gen.long) { (tree, bounds, seed) =>
      val pruned = ModelPruning.pruneTree(tree, bounds)
      val rng = new Random(seed)
      (1 to 20).forall { _ =>
        val x = Array.tabulate(5) { f =>
          val iv = bounds.getOrElse(f, Interval(-2.5, 2.5))
          iv.lo + rng.nextDouble() * (iv.hi - iv.lo)
        }
        tree.eval(x) == pruned.eval(x)
      }
    }

  property("pruning never grows the tree") =
    Prop.forAll(genTree(5, 5), genBounds) { (tree, bounds) =>
      ModelPruning.pruneTree(tree, bounds).nodeCount <= tree.nodeCount
    }

  property("point bounds on every feature collapse the tree to a leaf") =
    Prop.forAll(genTree(4, 3), Gen.listOfN(3, Gen.choose(-2.0, 2.0))) { (tree, pts) =>
      val bounds = pts.zipWithIndex.map { case (v, f) => f -> Interval.point(v) }.toMap
      ModelPruning.pruneTree(tree, bounds) match {
        case _: Leaf => true
        case _       => false
      }
    }

  property("densify+pushdown preserves tree-pipeline semantics") =
    Prop.forAll(genTree(4, 4), Gen.long) { (tree, seed) =>
      val ops: Vector[FeatOp] = Vector(
        ScaleOp("a", 1.0, 0.5), PassThroughOp("b"),
        OneHotOp("c", Vector("x", "y")))
      val p = Pipeline(ops, TreeEnsembleModel(Vector(tree), EnsembleKind.SingleTree, 4))
      val r = ProjectionPushdown(p)
      val idx = r.pipeline.inputCols.map(p.inputCols.indexOf)
      val rng = new Random(seed)
      (1 to 10).forall { _ =>
        val row: Array[Any] = Array(
          Double.box(rng.nextDouble() * 8 - 4),
          Double.box(rng.nextDouble() * 8 - 4),
          if (rng.nextBoolean()) "x" else "y")
        p.scoreRow(row) == r.pipeline.scoreRow(idx.map(row).toArray)
      }
    }

  property("interval intersection is idempotent and monotone") =
    Prop.forAll(Gen.choose(-5.0, 5.0), Gen.choose(-5.0, 5.0),
                Gen.choose(-5.0, 5.0), Gen.choose(-5.0, 5.0)) { (a, b, c, d) =>
      val i1 = Interval(math.min(a, b), math.max(a, b))
      val i2 = Interval(math.min(c, d), math.max(c, d))
      val m = i1.intersect(i2)
      m.intersect(i2) == m && m.intersect(i1) == m
    }
}
