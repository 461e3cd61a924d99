package repro.core

/** A named feature matrix over entities (matchers or sub-matchers).
  *
  * Feature names carry their set as a prefix ("lrsm_", "beh_", "mou_",
  * "seq_", "spa_") so the ablation study (Table III) can include/exclude
  * whole sets by masking columns.
  */
final case class FeatureTable(names: Vector[String], rows: Map[Long, Array[Double]]) {
  require(rows.values.forall(_.length == names.length), "ragged feature table")

  def vector(id: Long): Array[Double] = rows(id)

  /** Keep only the feature sets in `groups` (by name prefix). */
  def select(groups: Set[String]): FeatureTable = {
    val keep = names.zipWithIndex.filter { case (n, _) => groups.contains(groupOf(n)) }
    require(keep.nonEmpty, s"no features left after selecting $groups")
    val idx = keep.map(_._2)
    FeatureTable(keep.map(_._1), rows.view.mapValues(r => idx.map(r).toArray).toMap)
  }

  /** Column-wise concatenation; both tables must cover the same ids. */
  def ++(other: FeatureTable): FeatureTable = {
    require(rows.keySet == other.rows.keySet, "feature table id mismatch")
    FeatureTable(names ++ other.names,
      rows.map { case (id, v) => id -> (v ++ other.rows(id)) })
  }

  private def groupOf(name: String): String = name.takeWhile(_ != '_')
}

object FeatureTable {
  val AllGroups: Set[String] = Set("lrsm", "beh", "mou", "seq", "spa")
}
