package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Phase P1 (Section 4): find every structural match of a motif's spanning
  * path in the time-series graph, disregarding timestamps, δ and φ.
  *
  * The paper walks the spanning path with a modified DFS; the relational
  * equivalent is one self-join of the distinct-pair table per motif edge,
  * binding a new vertex column when the path reaches a vertex for the first
  * time and filtering against the bound column when it revisits one (cycle
  * closure), plus pairwise distinctness filters for the vertex bijection.
  * Catalyst plans this as a chain of shuffle joins — the distributed analogue
  * of the paper's DFS enumeration.
  */
object StructuralMatcher {

  /** Column name for the graph vertex bound to motif vertex `i`. */
  def vcol(i: Int): String = s"v$i"

  /** All structural matches. Output columns: `v0..v{numVertices-1}`, one row
    * per match, where `v{i}` is the graph vertex mapped to motif vertex `i`.
    *
    * @param pairs distinct `(src, dst)` pairs of `G_T` (see [[TimeSeriesGraph.pairs]])
    */
  def matches(pairs: DataFrame, motif: Motif): DataFrame = {
    val p = pairs.select(col("src"), col("dst"))
    val first = motif.edges.head
    var df = p.select(col("src").as(vcol(first._1)), col("dst").as(vcol(first._2)))
    var bound = Set(first._1, first._2)
    for (step <- 1 until motif.m) {
      val (a, b) = motif.edges(step)
      val stepDf = p.select(col("src").as("_sa"), col("dst").as("_sb"))
      df = df.join(stepDf, col(vcol(a)) === col("_sa"))
      df =
        if (bound(b)) df.where(col("_sb") === col(vcol(b))).drop("_sa", "_sb")
        else { bound += b; df.withColumn(vcol(b), col("_sb")).drop("_sa", "_sb") }
    }
    // Vertex bijection: distinct motif vertices map to distinct graph vertices.
    val vs = motif.vertexIds
    val distinctness = for { i <- vs; j <- vs if i < j } yield col(vcol(i)) =!= col(vcol(j))
    df.where(distinctness.reduceOption(_ && _).getOrElse(lit(true)))
      .select(vs.map(i => col(vcol(i))): _*)
  }

  /** The SQL a relational engine would run for the same match set — used by
    * tests to cross-check the Spark matcher against DuckDB over a `pairs`
    * table with columns (src, dst). Output column `n` = number of matches.
    */
  def countSql(motif: Motif, table: String = "pairs"): String = {
    val joins = motif.edges.zipWithIndex.map { case (_, i) => s"$table e$i" }.mkString(", ")
    val vertexOf = scala.collection.mutable.Map[Int, String]()
    val preds = scala.collection.mutable.ArrayBuffer[String]()
    motif.edges.zipWithIndex.foreach { case ((a, b), i) =>
      vertexOf.get(a) match {
        case Some(expr) => preds += s"e$i.src = $expr"
        case None       => vertexOf(a) = s"e$i.src"
      }
      vertexOf.get(b) match {
        case Some(expr) => preds += s"e$i.dst = $expr"
        case None       => vertexOf(b) = s"e$i.dst"
      }
    }
    for { i <- motif.vertexIds; j <- motif.vertexIds if i < j }
      preds += s"${vertexOf(i)} <> ${vertexOf(j)}"
    s"SELECT count(*) AS n FROM $joins WHERE ${preds.mkString(" AND ")}"
  }
}
