package repro.data

import repro.SparkSpec
import repro.core.ColumnRef

class ChemblLiteSpec extends SparkSpec {
  private lazy val repo = ChemblLite(spark)

  private def values(c: ColumnRef): Set[String] =
    repo(c.table).select(c.column).distinct().collect().map(_.getString(0)).toSet

  test("all expected tables exist") {
    val expected = Set("cell_dictionary", "assays", "assay_archive", "bioassay_ontology",
      "target_dictionary", "component_sequences", "component_class", "target_synonyms",
      "activities", "molecule_dictionary", "compound_records", "old_compounds",
      "lab_notes_1", "lab_notes_2", "lab_notes_3")
    assert(repo.tables.keySet == expected)
  }
  test("schemas are all-string and as declared") {
    assert(repo("assays").columns.toSeq ==
      Seq("assay_id", "cell_id", "cell_name", "cell_description", "assay_type", "assay_organism"))
    assert(repo.tables.values.forall(_.schema.fields.forall(_.dataType.typeName == "string")))
  }
  test("generation is deterministic in the seed") {
    val again = ChemblLite(spark)
    for (t <- Seq("assays", "component_class", "activities")) {
      assert(repo(t).collect().toSeq == again(t).collect().toSeq, t)
    }
  }
  test("different seeds change the data") {
    val other = ChemblLite(spark, seed = 99)
    assert(repo("assays").collect().toSeq != other("assays").collect().toSeq)
  }

  test("cell_dictionary aligns cell_id, cell_name, cell_description one-to-one") {
    val rows = repo("cell_dictionary").collect()
    assert(rows.map(_.getString(0)).distinct.length == rows.length)
    assert(rows.map(_.getString(1)).distinct.length == rows.length)
    assert(rows.map(_.getString(2)).distinct.length == rows.length)
  }
  test("assays carry the cell triple consistently with cell_dictionary") {
    val dict = repo("cell_dictionary").collect()
      .map(r => r.getString(0) -> (r.getString(1), r.getString(2))).toMap
    repo("assays").collect().foreach { r =>
      assert(dict(r.getString(1)) == ((r.getString(2), r.getString(3))),
        "the three aligned join keys must produce identical views (C1 design)")
    }
  }

  test("noise columns share ≈85% of their universe with the ground truth column") {
    for (gt <- repo.groundTruths; (gtCol, noiseCol) <- gt.noiseColumns) {
      val g = values(gtCol); val n = values(noiseCol)
      val containment = (g intersect n).size.toDouble / n.size
      assert(containment >= 0.75 && containment < 1.0,
        s"${gt.name}: containment of $noiseCol in $gtCol is $containment")
      assert((n diff g).nonEmpty, s"${gt.name}: $noiseCol needs noise-only values")
    }
  }
  test("description overlaps pref_name at ≈0.85 (the wrong-join-path design)") {
    val d = values(ColumnRef("component_sequences", "description"))
    val p = values(ColumnRef("target_dictionary", "pref_name"))
    val c = (d intersect p).size.toDouble / d.size
    assert(c >= 0.8 && c < 1.0, s"containment=$c")
  }
  test("component_class.pref_name is a permutation of the protein universe") {
    val cc = repo("component_class").collect().map(_.getString(1))
    assert(cc.distinct.length == cc.length, "unique per row → candidate key in Q4 views")
    assert(values(ColumnRef("component_class", "pref_name"))
      .subsetOf(values(ColumnRef("target_dictionary", "pref_name"))))
  }
  test("lab_notes collide with ~30% of proteins (below the 0.8 threshold)") {
    val tag = values(ColumnRef("lab_notes_1", "note_tag"))
    val p = values(ColumnRef("target_dictionary", "pref_name"))
    val c = (tag intersect p).size.toDouble / tag.size
    assert(c > 0.1 && c < 0.5, s"containment=$c")
  }
  test("activities reference existing assays, targets and molecules") {
    val assays = values(ColumnRef("assays", "assay_id"))
    val tids = values(ColumnRef("target_dictionary", "tid"))
    val mols = values(ColumnRef("molecule_dictionary", "molregno"))
    assert(values(ColumnRef("activities", "assay_id")).subsetOf(assays))
    assert(values(ColumnRef("activities", "tid")).subsetOf(tids))
    assert(values(ColumnRef("activities", "molregno")).subsetOf(mols))
  }
  test("compound_records share the drug-name universe with molecule_dictionary") {
    assert(values(ColumnRef("compound_records", "compound_name"))
      .subsetOf(values(ColumnRef("molecule_dictionary", "molecule_name"))))
  }
  test("five ground truths with well-formed specs") {
    assert(repo.groundTruths.map(_.name) ==
      Vector("chembl-Q1", "chembl-Q2", "chembl-Q3", "chembl-Q4", "chembl-Q5"))
    for (gt <- repo.groundTruths) {
      assert(gt.spec.connected, gt.name)
      gt.spec.tables.foreach(t => assert(repo.tables.contains(t), s"${gt.name}: $t"))
      for (c <- gt.spec.projection ++ gt.noiseColumns.values)
        assert(repo(c.table).columns.contains(c.column), s"${gt.name}: $c")
    }
  }
  test("Q2's ground truth is a 2-hop join through activities") {
    val q2 = repo.groundTruths.find(_.name == "chembl-Q2").get
    assert(q2.spec.hops == 2 && q2.spec.tables.contains("activities"))
  }
  test("scale shrinks the tables") {
    val small = ChemblLite(spark, scale = 0.5)
    assert(small("assays").count() < repo("assays").count())
  }
}
