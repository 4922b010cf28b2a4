package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.catalyst.expressions.{
  Add => CAdd, And => CAnd, CaseWhen, Divide => CDiv, EqualTo, Expression, GreaterThan,
  GreaterThanOrEqual, LessThanOrEqual, Literal, Multiply => CMul, Not => CNot, Or => COr,
  Subtract => CSub,
}
import org.apache.spark.sql.{functions => F}
import org.apache.spark.sql.functions.{lit, when}

/** Dialect-neutral scalar expression AST produced by MLtoSQL (paper §5.1).
  *
  * One compilation, three renderers: a Spark `Column` (DataFrame path), a
  * Catalyst `Expression` (the `RavenRule` path), and SQL text (the
  * SQL-Server-substrate / DuckDB path).
  */
sealed trait SqlExpr {
  def render: String = SqlExpr.toSql(this)
}
object SqlExpr {
  final case class SCol(name: String) extends SqlExpr
  final case class SNum(v: Double) extends SqlExpr
  final case class SStr(v: String) extends SqlExpr
  final case class SBool(v: Boolean) extends SqlExpr
  /** op ∈ {+, -, *, /, <=, <, >, >=, =, <>, AND, OR}. */
  final case class SBin(op: String, l: SqlExpr, r: SqlExpr) extends SqlExpr
  final case class SNot(e: SqlExpr) extends SqlExpr
  final case class SCase(branches: Seq[(SqlExpr, SqlExpr)], otherwise: SqlExpr) extends SqlExpr

  /** Left-nested sum; SNum(0) for empty. */
  def sum(es: Seq[SqlExpr]): SqlExpr = es match {
    case Seq()  => SNum(0.0)
    case Seq(e) => e
    case more   => more.reduceLeft(SBin("+", _, _))
  }

  // --- renderers ----------------------------------------------------------

  def toSql(e: SqlExpr): String = e match {
    case SCol(n)  => n
    case SNum(v)  =>
      if (v == Double.PositiveInfinity) "1e308"
      else if (v == Double.NegativeInfinity) "-1e308"
      else v.toString
    case SStr(v)  => "'" + v.replace("'", "''") + "'"
    case SBool(v) => if (v) "TRUE" else "FALSE"
    case SBin(op, l, r) => s"(${toSql(l)} $op ${toSql(r)})"
    case SNot(x)  => s"(NOT ${toSql(x)})"
    case SCase(bs, o) =>
      bs.map { case (c, v) => s"WHEN ${toSql(c)} THEN ${toSql(v)}" }
        .mkString("CASE ", " ", s" ELSE ${toSql(o)} END")
  }

  def toColumn(e: SqlExpr, col: String => Column): Column = e match {
    case SCol(n)  => col(n)
    case SNum(v)  => lit(v)
    case SStr(v)  => lit(v)
    case SBool(v) => lit(v)
    case SBin(op, l, r) =>
      val (a, b) = (toColumn(l, col), toColumn(r, col))
      op match {
        case "+"  => a + b
        case "-"  => a - b
        case "*"  => a * b
        case "/"  => a / b
        case "<=" => a <= b
        case "<"  => a < b
        case ">"  => a > b
        case ">=" => a >= b
        case "="  => a === b
        case "<>" => a =!= b
        case "AND" => a && b
        case "OR"  => a || b
      }
    case SNot(x) => !toColumn(x, col)
    case SCase(bs, o) =>
      val start = when(toColumn(bs.head._1, col), toColumn(bs.head._2, col))
      bs.tail.foldLeft(start) { case (acc, (c, v)) =>
        acc.when(toColumn(c, col), toColumn(v, col))
      }.otherwise(toColumn(o, col))
  }

  def toCatalyst(e: SqlExpr, col: String => Expression): Expression = e match {
    case SCol(n)  => col(n)
    case SNum(v)  => Literal(v)
    case SStr(v)  => Literal.create(v)
    case SBool(v) => Literal(v)
    case SBin(op, l, r) =>
      val (a, b) = (toCatalyst(l, col), toCatalyst(r, col))
      op match {
        case "+"  => CAdd(a, b)
        case "-"  => CSub(a, b)
        case "*"  => CMul(a, b)
        case "/"  => CDiv(a, b)
        case "<=" => LessThanOrEqual(a, b)
        case "<"  => org.apache.spark.sql.catalyst.expressions.LessThan(a, b)
        case ">"  => GreaterThan(a, b)
        case ">=" => GreaterThanOrEqual(a, b)
        case "="  => EqualTo(a, b)
        case "<>" => CNot(EqualTo(a, b))
        case "AND" => CAnd(a, b)
        case "OR"  => COr(a, b)
      }
    case SNot(x) => CNot(toCatalyst(x, col))
    case SCase(bs, o) =>
      CaseWhen(bs.map { case (c, v) => (toCatalyst(c, col), toCatalyst(v, col)) },
               Some(toCatalyst(o, col)))
  }
}

/** Compiles a trained pipeline into a single scalar expression over the raw
  * input columns — the MLtoSQL logical-to-physical transformation (§5.1).
  *
  * Trees become nested CASE expressions (depth-first, as in the paper's
  * TreeClassifier example); linear models and scalers become arithmetic;
  * a OneHotEncoder feeding a linear model becomes a per-column CASE weight
  * lookup; one-hot features inside tree splits simplify to string
  * (in)equality on the raw column, and scaled-numeric thresholds are
  * unscaled back into raw-column space.
  */
object MLtoSQL {
  import SqlExpr._

  /** Boolean expr for `encodedFeature(i) <= t` in terms of the raw column. */
  private def featureLE(p: Pipeline, i: Int, t: Double): SqlExpr = {
    val ref = p.featureRefs(i)
    p.ops(ref.opIndex) match {
      case ScaleOp(c, o, s) =>
        if (s > 0) SBin("<=", SCol(c), SNum(t / s + o))
        else if (s < 0) SBin(">=", SCol(c), SNum(t / s + o))
        else SBool(0.0 <= t) // degenerate scaler: feature is constant 0
      case PassThroughOp(c) => SBin("<=", SCol(c), SNum(t))
      case OneHotOp(c, cats) =>
        val cat = cats(ref.slot)
        if (t >= 1.0) SBool(true)         // both 0 and 1 pass
        else if (t < 0.0) SBool(false)    // neither passes
        else SNot(SBin("=", SCol(c), SStr(cat))) // 0 <= t < 1: passes iff not the category
    }
  }

  /** Numeric expr for `encodedFeature(i)` in terms of the raw column. */
  def featureExpr(p: Pipeline, i: Int): SqlExpr = {
    val ref = p.featureRefs(i)
    p.ops(ref.opIndex) match {
      case ScaleOp(c, o, s) => SBin("*", SBin("-", SCol(c), SNum(o)), SNum(s))
      case PassThroughOp(c) => SCol(c)
      case OneHotOp(c, cats) =>
        SCase(Seq((SBin("=", SCol(c), SStr(cats(ref.slot))), SNum(1.0))), SNum(0.0))
    }
  }

  private def treeExpr(p: Pipeline, n: TreeNode): SqlExpr = n match {
    case Leaf(v) => SNum(v)
    case Split(f, t, l, r) =>
      SCase(Seq((featureLE(p, f, t), treeExpr(p, l))), treeExpr(p, r))
  }

  /** Raw pre-threshold aggregate of the model (margin for LR/GB, mean leaf
    * probability for DT/RF) as an expression over raw columns.
    */
  def rawScoreExpr(p: Pipeline): SqlExpr = {
    require(p.extractor.isEmpty, "compile after pushdown (no pending extractor)")
    p.model match {
      case lm: LinearModel =>
        // Every weight term is emitted, zero or not — as in the paper, where
        // MLtoSQL alone does not drop unused LR features (only model-
        // projection pushdown does; cf. §7.2.1 vs the DT discussion in
        // §7.2.2 where tree conversion skips unused paths naturally).
        // fold scaler algebra: w * (x - o) * s  =  (w*s) * x  +  (-w*s*o)
        var const = lm.intercept
        val terms = Seq.newBuilder[SqlExpr]
        var off = 0
        p.ops.foreach { op =>
          op match {
            case ScaleOp(c, o, s) =>
              val w = lm.weights(off)
              terms += SBin("*", SCol(c), SNum(w * s)); const -= w * s * o
            case PassThroughOp(c) =>
              terms += SBin("*", SCol(c), SNum(lm.weights(off)))
            case OneHotOp(c, cats) =>
              // one CASE per categorical input: category -> weight lookup
              val branches = cats.zipWithIndex.map { case (cat, k) =>
                (SBin("=", SCol(c), SStr(cat)), SNum(lm.weights(off + k)))
              }
              terms += SCase(branches, SNum(0.0))
          }
          off += op.width
        }
        SqlExpr.sum(terms.result() :+ SNum(const))
      case te: TreeEnsembleModel =>
        val treeSum = SqlExpr.sum(te.trees.map(t => treeExpr(p, t)))
        te.kind match {
          case EnsembleKind.SingleTree          => treeSum
          case EnsembleKind.RandomForest        => SBin("/", treeSum, SNum(te.trees.size.toDouble))
          case EnsembleKind.GradientBoosting(b) => SBin("+", treeSum, SNum(b))
        }
    }
  }

  /** Hard 0/1 class prediction as an expression over raw columns. Uses the
    * monotonicity of sigmoid: for LR/GB, class = raw >= 0; for DT/RF,
    * class = mean leaf probability >= 0.5.
    */
  def classifyExpr(p: Pipeline): SqlExpr = {
    val raw = rawScoreExpr(p)
    val threshold = p.model match {
      case _: LinearModel => 0.0
      case te: TreeEnsembleModel =>
        te.kind match {
          case EnsembleKind.GradientBoosting(_) => 0.0
          case _                                => 0.5
        }
    }
    SCase(Seq((SBin(">=", raw, SNum(threshold)), SNum(1.0))), SNum(0.0))
  }

  /** Spark Column for the class prediction, resolving columns by name. */
  def classifyColumn(p: Pipeline): Column =
    SqlExpr.toColumn(classifyExpr(p), F.col)

  /** SQL text for the class prediction (DuckDB / SQL Server substrate). */
  def classifySql(p: Pipeline): String = SqlExpr.toSql(classifyExpr(p))

  // --- dense variants (over pre-featurized columns f0..f{n-1}) ------------
  // Used by the MADlib simulation, which materializes the featurization
  // output as a table and then applies the model over it (paper §7.1.2:
  // "MADlib does not support pipelining of ML operations ... we were forced
  // to materialize the output of the featurization").

  /** SELECT-list of featurized columns: alias -> expression over raw cols. */
  def featurizeSelectList(p: Pipeline): Seq[(String, SqlExpr)] =
    (0 until p.encodedWidth).map(i => s"f$i" -> featureExpr(p, i))

  private def treeExprDense(n: TreeNode): SqlExpr = n match {
    case Leaf(v) => SNum(v)
    case Split(f, t, l, r) =>
      SCase(Seq((SBin("<=", SCol(s"f$f"), SNum(t)), treeExprDense(l))), treeExprDense(r))
  }

  /** Class prediction over featurized columns f0..f{n-1}. */
  def classifyExprDense(model: Model): SqlExpr = {
    val (raw, threshold) = model match {
      case lm: LinearModel =>
        val terms = lm.weights.zipWithIndex.collect {
          case (w, i) if w != 0.0 => SBin("*", SCol(s"f$i"), SNum(w)): SqlExpr
        }
        (SqlExpr.sum(terms :+ SNum(lm.intercept)), 0.0)
      case te: TreeEnsembleModel =>
        val treeSum = SqlExpr.sum(te.trees.map(treeExprDense))
        te.kind match {
          case EnsembleKind.SingleTree          => (treeSum, 0.5)
          case EnsembleKind.RandomForest        =>
            (SBin("/", treeSum, SNum(te.trees.size.toDouble)), 0.5)
          case EnsembleKind.GradientBoosting(b) => (SBin("+", treeSum, SNum(b)), 0.0)
        }
    }
    SCase(Seq((SBin(">=", raw, SNum(threshold)), SNum(1.0))), SNum(0.0))
  }
}
