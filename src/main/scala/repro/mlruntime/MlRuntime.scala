package repro.mlruntime

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, DataInputStream, DataOutputStream}

import org.apache.spark.sql.{DataFrame, Encoders, Row}
import org.apache.spark.sql.types.{DoubleType, StructField, StructType}
import repro.core.{OneHotOp, Pipeline}

/** Simulated external ML runtime invoked from Spark (paper §6).
  *
  * The paper's Raven UDF is a Python *vectorized* UDF: Spark hands 10k-row
  * Arrow batches to a Python process which converts them to pandas, invokes
  * ONNX Runtime, and ships predictions back. We reproduce the two costs that
  * matter for Raven's optimizations *mechanistically* rather than with
  * sleeps:
  *
  *   - the engine↔runtime **data-conversion boundary**: every batch of input
  *     columns is serialized to a byte buffer and deserialized on the "other
  *     side" (cost ∝ rows × width, like the row→Arrow→pandas hops), and the
  *     predictions are serialized back;
  *   - **interpreter-style evaluation**: the model walks heap tree objects /
  *     weight vectors per row instead of engine-native compiled expressions.
  *
  * `Style.Ort` models ONNX Runtime (one boundary round-trip per batch);
  * `Style.Skl` models the scikit-learn UDF path, which pays an extra
  * conversion hop and materializes per-row boxed records (pandas row dicts).
  */
object MlRuntime {

  sealed trait Style
  object Style {
    case object Ort extends Style
    case object Skl extends Style
  }

  val DefaultBatchSize = 10000

  /** Append a `prediction` column (hard 0/1 class) computed by the external
    * runtime over the pipeline's input columns. All other columns pass
    * through untouched.
    */
  def predict(
      df: DataFrame,
      pipeline: Pipeline,
      style: Style = Style.Ort,
      batchSize: Int = DefaultBatchSize,
  ): DataFrame = {
    val schema    = df.schema
    val inputCols = pipeline.inputCols
    val positions = inputCols.map(schema.fieldIndex).toArray
    val isNumeric = inputCols.map { c =>
      // OneHot inputs are strings; everything else numeric
      !pipeline.ops.exists { case OneHotOp(`c`, _) => true; case _ => false }
    }.toArray
    val outSchema = StructType(schema.fields :+ StructField("prediction", DoubleType, nullable = false))
    val colIdx    = inputCols.zipWithIndex.toMap

    df.mapPartitions { it =>
      it.grouped(batchSize).flatMap { batch =>
        val preds = scoreBatch(batch, pipeline, colIdx, positions, isNumeric, style)
        batch.iterator.zipWithIndex.map { case (row, i) =>
          Row.fromSeq(row.toSeq :+ preds(i))
        }
      }
    }(Encoders.row(outSchema))
  }

  /** Evaluate one batch through the serialization boundary. Package-private
    * so the DuckDB substrate can reuse the same runtime semantics.
    */
  private[repro] def scoreBatch(
      batch: Seq[Row],
      pipeline: Pipeline,
      colIdx: Map[String, Int],
      positions: Array[Int],
      isNumeric: Array[Boolean],
      style: Style,
  ): Array[Double] = {
    // engine side: encode the input columns of the batch
    val bytes = encode(batch, positions, isNumeric)
    // runtime side: decode, (optionally) build boxed row records, evaluate
    val rows = decode(bytes, batch.size, positions.length, isNumeric)
    val effective: Array[Array[Any]] = style match {
      case Style.Ort => rows
      case Style.Skl =>
        // sklearn path: extra conversion hop + per-row boxed dict records
        val again = decode(encode2(rows, isNumeric), batch.size, positions.length, isNumeric)
        again.map { r =>
          val m = new java.util.HashMap[String, Any]()
          var i = 0
          while (i < r.length) { m.put(pipeline.inputCols(i), r(i)); i += 1 }
          val out = new Array[Any](r.length)
          i = 0
          while (i < r.length) { out(i) = m.get(pipeline.inputCols(i)); i += 1 }
          out
        }
    }
    val preds = new Array[Double](effective.length)
    var i = 0
    while (i < effective.length) {
      preds(i) = if (pipeline.model.score(pipeline.featurizeWith(effective(i), colIdx)) >= 0.5) 1.0 else 0.0
      i += 1
    }
    // ship predictions back across the boundary
    roundTripDoubles(preds)
  }

  private def encode(batch: Seq[Row], positions: Array[Int], isNumeric: Array[Boolean]): Array[Byte] = {
    val bos = new ByteArrayOutputStream(batch.size * positions.length * 8)
    val out = new DataOutputStream(bos)
    batch.foreach { row =>
      var i = 0
      while (i < positions.length) {
        if (isNumeric(i)) out.writeDouble(numOf(row.get(positions(i))))
        else out.writeUTF(String.valueOf(row.get(positions(i))))
        i += 1
      }
    }
    out.flush()
    bos.toByteArray
  }

  private def encode2(rows: Array[Array[Any]], isNumeric: Array[Boolean]): Array[Byte] = {
    val bos = new ByteArrayOutputStream(rows.length * isNumeric.length * 8)
    val out = new DataOutputStream(bos)
    rows.foreach { r =>
      var i = 0
      while (i < r.length) {
        if (isNumeric(i)) out.writeDouble(r(i).asInstanceOf[Double])
        else out.writeUTF(r(i).asInstanceOf[String])
        i += 1
      }
    }
    out.flush()
    bos.toByteArray
  }

  private def decode(bytes: Array[Byte], n: Int, width: Int, isNumeric: Array[Boolean]): Array[Array[Any]] = {
    val in = new DataInputStream(new ByteArrayInputStream(bytes))
    val rows = new Array[Array[Any]](n)
    var r = 0
    while (r < n) {
      val row = new Array[Any](width)
      var i = 0
      while (i < width) {
        row(i) = if (isNumeric(i)) java.lang.Double.valueOf(in.readDouble()) else in.readUTF()
        i += 1
      }
      rows(r) = row
      r += 1
    }
    rows
  }

  private def roundTripDoubles(xs: Array[Double]): Array[Double] = {
    val bos = new ByteArrayOutputStream(xs.length * 8)
    val out = new DataOutputStream(bos)
    xs.foreach(out.writeDouble)
    out.flush()
    val in  = new DataInputStream(new ByteArrayInputStream(bos.toByteArray))
    Array.fill(xs.length)(in.readDouble())
  }

  private def numOf(a: Any): Double = a match {
    case n: java.lang.Number => n.doubleValue()
    case other               => throw new IllegalArgumentException(s"expected numeric, got $other")
  }
}
