package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{AttrSet, Schema}
import repro.core.entropy.EncodedRelation

/** A concrete instance of the paper's running example (Sec. 2, Fig. 1/2):
  * relation over Ω = {A,B,C,D,E,F} with the acyclic schema
  * {ABD, ACD, BDE, AF}. The figure's cell values are not in the text, so
  * this instance is constructed to realize every property the paper states:
  *
  *  - the 4-tuple relation satisfies the join dependency exactly (J = 0),
  *  - H(ABCDEF) = 2, H(BDE) = 3/2 (marginals 1/4, 1/4, 1/2),
  *  - support MVDs BD ↠ E|ACF, AD ↠ CF|BE, A ↠ F|BCDE all hold exactly,
  *  - adding the 5th "red" tuple breaks the first two support MVDs while
  *    A ↠ F|BCDE keeps holding, and the schema join gains spurious tuples.
  */
object RunningExample {

  val names: Vector[String] = Vector("A", "B", "C", "D", "E", "F")

  val cleanTuples: Seq[Seq[String]] = Seq(
    Seq("a1", "b1", "c1", "d1", "e1", "f1"),
    Seq("a1", "b1", "c2", "d1", "e1", "f1"),
    Seq("a2", "b2", "c2", "d2", "e2", "f2"),
    Seq("a2", "b1", "c2", "d2", "e3", "f2"),
  )

  /** The red tuple: breaks BD ↠ E|ACF and AD ↠ CF|BE, keeps A ↠ F|BCDE. */
  val redTuple: Seq[String] = Seq("a2", "b2", "c3", "d2", "e3", "f2")

  def clean(spark: SparkSession): DataFrame = toDf(spark, cleanTuples)
  def withRed(spark: SparkSession): DataFrame = toDf(spark, cleanTuples :+ redTuple)

  def cleanEncoded: EncodedRelation = EncodedRelation.fromTuples(names, cleanTuples)
  def withRedEncoded: EncodedRelation =
    EncodedRelation.fromTuples(names, cleanTuples :+ redTuple)

  // Attribute indices: A=0 B=1 C=2 D=3 E=4 F=5.
  val A = 0; val B = 1; val C = 2; val D = 3; val E = 4; val F = 5

  /** The paper's schema {ABD, ACD, BDE, AF}. */
  val paperSchema: Schema = Schema.of(Vector(
    AttrSet.of(A, B, D), AttrSet.of(A, C, D), AttrSet.of(B, D, E), AttrSet.of(A, F)))

  private def toDf(spark: SparkSession, tuples: Seq[Seq[String]]): DataFrame = {
    import spark.implicits._
    tuples.map(t => (t(0), t(1), t(2), t(3), t(4), t(5)))
      .toDF(names: _*)
  }
}
