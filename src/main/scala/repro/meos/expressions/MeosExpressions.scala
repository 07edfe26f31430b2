package repro.meos.expressions

import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.Expression
import org.apache.spark.sql.catalyst.expressions.codegen.CodegenFallback
import org.apache.spark.sql.catalyst.util.ArrayData
import org.apache.spark.sql.types._

import repro.meos.Geo

/** Catalyst expressions mirroring NebulaMEOS's custom operators.
  *
  * The paper integrates MEOS into NebulaStream's expression framework
  * via dynamically registered operators (e.g. `MeosAtStbox_Expression`
  * wrapping `edwithin` / `tpoint_at_stbox`). Here the same predicates
  * are Catalyst `Expression`s (interpreted via `CodegenFallback` —
  * equivalent to NebulaStream's non-compiled plugin path) registered in
  * the session `FunctionRegistry` by [[repro.meos.MeosFunctions]].
  *
  * All are null-intolerant: any null child yields null.
  */
abstract class MeosScalarExpression extends Expression with CodegenFallback {
  override def nullable: Boolean = true

  /** Evaluate with all children non-null. */
  protected def evalNotNull(vals: IndexedSeq[Any]): Any

  override def eval(input: InternalRow): Any = {
    val vals = children.map(_.eval(input)).toIndexedSeq
    if (vals.exists(_ == null)) null else evalNotNull(vals)
  }

  protected def d(v: Any): Double = v match {
    case x: Double => x
    case x: Float => x.toDouble
    case x: Int => x.toDouble
    case x: Long => x.toDouble
    case x: Short => x.toDouble
    case x: Byte => x.toDouble
    case x: Decimal => x.toDouble // SQL literals like 4.40 arrive as DECIMAL
    case x => throw new IllegalArgumentException(s"expected numeric, got $x")
  }
}

/** `st_distance(lon1, lat1, lon2, lat2)` — planar distance in meters. */
case class StDistance(children: Seq[Expression]) extends MeosScalarExpression {
  require(children.length == 4, "st_distance(lon1, lat1, lon2, lat2)")
  override def dataType: DataType = DoubleType
  override protected def evalNotNull(v: IndexedSeq[Any]): Any =
    Geo.distMeters(d(v(0)), d(v(1)), d(v(2)), d(v(3)))
  override protected def withNewChildrenInternal(c: IndexedSeq[Expression]): Expression =
    copy(children = c)
}

/** `ed_within(lon1, lat1, lon2, lat2, dMeters)` — MEOS `edwithin` for
  * point arguments: are the two positions within `d` meters?
  */
case class EdWithin(children: Seq[Expression]) extends MeosScalarExpression {
  require(children.length == 5, "ed_within(lon1, lat1, lon2, lat2, dMeters)")
  override def dataType: DataType = BooleanType
  override protected def evalNotNull(v: IndexedSeq[Any]): Any =
    Geo.dWithin(d(v(0)), d(v(1)), d(v(2)), d(v(3)), d(v(4)))
  override protected def withNewChildrenInternal(c: IndexedSeq[Expression]): Expression =
    copy(children = c)
}

/** `st_in_stbox(lon, lat, ts, xmin, xmax, ymin, ymax, tmin, tmax)` —
  * is the spatiotemporal point inside the STBox (closed bounds)?
  * The spine of the paper's `MeosAtStbox_Expression` for instant input.
  */
case class StInStbox(children: Seq[Expression]) extends MeosScalarExpression {
  require(children.length == 9,
    "st_in_stbox(lon, lat, ts, xmin, xmax, ymin, ymax, tmin, tmax)")
  override def dataType: DataType = BooleanType
  override protected def evalNotNull(v: IndexedSeq[Any]): Any = {
    val lon = d(v(0)); val lat = d(v(1)); val ts = d(v(2))
    lon >= d(v(3)) && lon <= d(v(4)) &&
      lat >= d(v(5)) && lat <= d(v(6)) &&
      ts >= d(v(7)) && ts <= d(v(8))
  }
  override protected def withNewChildrenInternal(c: IndexedSeq[Expression]): Expression =
    copy(children = c)
}

/** `st_in_box(lon, lat, xmin, xmax, ymin, ymax)` — purely spatial box
  * containment (the geofence fast path).
  */
case class StInBox(children: Seq[Expression]) extends MeosScalarExpression {
  require(children.length == 6, "st_in_box(lon, lat, xmin, xmax, ymin, ymax)")
  override def dataType: DataType = BooleanType
  override protected def evalNotNull(v: IndexedSeq[Any]): Any = {
    val lon = d(v(0)); val lat = d(v(1))
    lon >= d(v(2)) && lon <= d(v(3)) && lat >= d(v(4)) && lat <= d(v(5))
  }
  override protected def withNewChildrenInternal(c: IndexedSeq[Expression]): Expression =
    copy(children = c)
}

/** `st_point_in_poly(lon, lat, ring)` — ray-casting containment where
  * `ring` is a flattened array<double> of [x0, y0, x1, y1, ...].
  */
case class StPointInPoly(children: Seq[Expression]) extends MeosScalarExpression {
  require(children.length == 3, "st_point_in_poly(lon, lat, ringArray)")
  override def dataType: DataType = BooleanType
  override def checkInputDataTypes(): org.apache.spark.sql.catalyst.analysis.TypeCheckResult = {
    children(2).dataType match {
      case ArrayType(DoubleType, _) =>
        org.apache.spark.sql.catalyst.analysis.TypeCheckResult.TypeCheckSuccess
      case other =>
        org.apache.spark.sql.catalyst.analysis.TypeCheckResult.TypeCheckFailure(
          s"st_point_in_poly ring must be array<double>, got $other")
    }
  }
  override protected def evalNotNull(v: IndexedSeq[Any]): Any = {
    val ring = v(2).asInstanceOf[ArrayData].toDoubleArray().toIndexedSeq
    Geo.pointInPolygon(d(v(0)), d(v(1)), ring)
  }
  override protected def withNewChildrenInternal(c: IndexedSeq[Expression]): Expression =
    copy(children = c)
}
