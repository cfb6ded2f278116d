"""Per-lake recipes: synthetic Pharma, UK-Open, and ML-Open lakes.

Each recipe mirrors the corresponding real lake's *distributional*
profile from paper Tables 1-2 at ~10-40x reduced scale: collection
structure, numeric-attribute fraction, cardinality skew (mQCR regime),
union-variant renaming style, and the dirty-data artifacts §6.2 blames
for the accuracy shapes (duplicate keys, schema-less semantic joins,
out-of-range FK values).
"""
from __future__ import annotations

import numpy as np

from repro.lake.generator import Lake, LakeBuilder

# DrugBank-synthetic column-name synonym map (§6.3: synthetic tables by
# projection/selection; we additionally rename through synonyms so the
# name measure is weak and the semantic measure strong, per Table 5/3B).
PHARMA_SYNONYMS = {
    "drug": "medicine", "name": "label", "enzyme": "catalyst",
    "gene": "locus", "disease": "illness", "id": "ref", "event": "incident",
}


def pharma_lake(seed: int = 11) -> Lake:
    b = LakeBuilder("pharma", seed)
    rng = b.rng
    for t, n, syn in [
        ("drug", 520, ("medicine",)), ("drugname", 520, ("medicinename",)),
        ("enzyme", 260, ("catalyst",)), ("enzymename", 260, ()),
        ("gene", 260, ("locus",)), ("genename", 260, ()),
        ("protein", 220, ()), ("disease", 220, ("illness",)),
        ("diseasename", 220, ()), ("compound", 430, ("molecule",)),
        ("assay", 160, ()), ("targetname", 160, ()), ("organism", 48, ()),
        ("eventname", 170, ("incidentname",)), ("maker", 95, ()),
        ("pathway", 130, ()), ("salt", 100, ()), ("formula", 100, ()),
        ("country", 40, ()), ("ingredient", 95, ()), ("journal", 60, ()),
        ("drugtype", 6, ()), ("phase", 5, ()), ("form", 7, ()),
        ("severity", 4, ()), ("assaytype", 5, ()), ("unit", 6, ()),
        ("relation", 5, ()), ("chebiname", 320, ()), ("trial", 110, ()),
    ]:
        b.add_topic(t, n, synonyms=syn)

    # ---------------- drugbank (CSV) ---------------------------------------
    C = "drugbank"
    b.add_collection(C, "CSV")
    drug_pool = b.pool("drug", 0, 460)
    active = drug_pool[:150]  # "active" drugs cited by most FK columns

    def cat(table, column, topic, n):
        return b.add_str_column(C, table, column, topic=topic,
                                values=rng.choice(b.pool(topic), size=n))

    pk_drug = b.add_str_column(C, "drugs", "drug_id", topic="drug", values=drug_pool)
    b.add_str_column(C, "drugs", "drug_name", topic="drugname",
                     values=b.pool("drugname", 0, 460))
    cat("drugs", "drug_type", "drugtype", 460)
    b.add_num_column(C, "drugs", "mol_weight", lo=100, hi=900, n=460)

    pk_enz = b.add_str_column(C, "enzyme_targets", "enzyme_id", topic="enzyme",
                              values=b.pool("enzyme", 0, 230))
    b.add_str_column(C, "enzyme_targets", "enzyme_name", topic="enzymename",
                     values=b.pool("enzymename", 0, 230))
    fk_enz_drug = b.add_str_column(C, "enzyme_targets", "drug_id", topic="drug",
                                   values=b.sample(active, 60))
    cat("enzyme_targets", "organism", "organism", 230)

    fk_int_a = b.add_str_column(C, "drug_interactions", "drug_id_a", topic="drug",
                                values=b.sample(drug_pool, 330), dup_frac=0.15)
    fk_int_b = b.add_str_column(C, "drug_interactions", "drug_id_b", topic="drug",
                                values=b.sample(drug_pool, 310), dup_frac=0.15)
    cat("drug_interactions", "severity", "severity", 330)

    pk_gene = b.add_str_column(C, "gene_targets", "gene_id", topic="gene",
                               values=b.pool("gene", 0, 240))
    b.add_str_column(C, "gene_targets", "gene_name", topic="genename",
                     values=b.pool("genename", 0, 240))
    fk_gene_drug = b.add_str_column(C, "gene_targets", "drug_id", topic="drug",
                                    values=b.sample(active, 50))

    pk_prot = b.add_str_column(C, "proteins", "protein_id", topic="protein",
                               values=b.pool("protein", 0, 200))
    fk_prot_gene = b.add_str_column(C, "proteins", "gene_id", topic="gene",
                                    values=b.sample(b.pool("gene", 0, 240), 180))
    b.add_num_column(C, "proteins", "mass", lo=5, hi=300, n=200)

    pk_path = b.add_str_column(C, "pathways", "pathway_id", topic="pathway",
                               values=b.pool("pathway", 0, 125))
    fk_path_prot = b.add_str_column(C, "pathways", "protein_id", topic="protein",
                                    values=b.sample(b.pool("protein", 0, 200), 45))

    pk_dis = b.add_str_column(C, "diseases", "disease_id", topic="disease",
                              values=b.pool("disease", 0, 210))
    b.add_str_column(C, "diseases", "disease_name", topic="diseasename",
                     values=b.pool("diseasename", 0, 210))

    fk_ind_drug = b.add_str_column(C, "indications", "drug_id", topic="drug",
                                   values=b.sample(active, 125))
    fk_ind_dis = b.add_str_column(C, "indications", "disease_id", topic="disease",
                                  values=b.sample(b.pool("disease", 0, 210), 170))
    b.add_num_column(C, "indications", "efficacy", lo=0, hi=1, n=170)

    pk_trial = b.add_str_column(C, "trials", "trial_id", topic="trial",
                                values=b.pool("trial", 0, 100))
    fk_trial_drug = b.add_str_column(C, "trials", "drug_id", topic="drug",
                                     values=b.sample(active, 40))
    cat("trials", "phase", "phase", 100)
    b.add_num_column(C, "trials", "enrollment", lo=20, hi=5000, n=100, integer=True)

    fk_dos_drug = b.add_str_column(C, "dosages", "drug_id", topic="drug",
                                   values=b.sample(active, 125))
    cat("dosages", "form", "form", 120)
    b.add_num_column(C, "dosages", "strength", lo=1, hi=500, n=120)

    pk_mfr = b.add_str_column(C, "manufacturers", "mfr_id", topic="maker",
                              values=b.pool("maker", 0, 85))
    cat("manufacturers", "country", "country", 85)
    fk_dm_drug = b.add_str_column(C, "drug_makers", "drug_id", topic="drug",
                                  values=b.sample(active, 120))
    fk_dm_mfr = b.add_str_column(C, "drug_makers", "mfr_id", topic="maker",
                                 values=b.sample(b.pool("maker", 0, 85), 50))

    pk_event = b.add_str_column(C, "adverse_events", "event_id", topic="eventname",
                                values=b.pool("eventname", 0, 150))
    # dirty FK: over half the values fall outside the drugs PK domain →
    # exact containment ~0.45, safely below the discovery threshold even
    # under the skew-amplified estimator variance
    dirty = list(b.sample(active, 28)) + [f"exdrug{i:04d}" for i in range(34)]
    fk_ev_drug = b.add_str_column(C, "adverse_events", "drug_id", topic="drug",
                                  values=np.array(dirty))

    pk_salt = b.add_str_column(C, "salts", "salt_id", topic="salt",
                               values=b.pool("salt", 0, 95))
    fk_salt_drug = b.add_str_column(C, "salts", "drug_id", topic="drug",
                                    values=b.sample(active, 35))
    b.add_str_column(C, "salts", "formula", topic="formula", values=b.pool("formula", 0, 95))

    # near-unique decoy overlapping the salt PK domain with a similar name —
    # a false PK-FK for both systems (neither GT records it)
    b.add_str_column(C, "impurities", "salt_ref", topic="salt",
                     values=b.sample(b.pool("salt", 0, 95), 85))
    b.add_num_column(C, "impurities", "ppm", lo=0, hi=500, n=85)

    # additional small curation tables, each with a near-unique drug_id FK
    # drawn from the active pool (they nest inside the big FK columns above,
    # which is what floods CMDL's lenient key test with false PK-FK links)
    fk_pr_drug = b.add_str_column(C, "pricing", "drug_id", topic="drug",
                                  values=b.sample(active, 55))
    b.add_num_column(C, "pricing", "price", lo=1, hi=1000, n=55)
    fk_rc_drug = b.add_str_column(C, "recalls", "drug_id", topic="drug",
                                  values=b.sample(active, 45))
    cat("recalls", "severity", "severity", 45)
    fk_sh_drug = b.add_str_column(C, "shortages", "drug_id", topic="drug",
                                  values=b.sample(active, 50))
    cat("shortages", "status", "phase", 50)
    fk_lb_drug = b.add_str_column(C, "labels", "drug_id", topic="drug",
                                  values=b.sample(active, 60))
    b.add_str_column(C, "labels", "formula", topic="formula",
                     values=b.sample(b.pool("formula"), 55))
    # one larger FK outside the active pool so Aurum's Jaccard also finds it
    fk_br_drug = b.add_str_column(C, "brands", "drug_id", topic="drug",
                                  values=b.sample(drug_pool, 210))
    fk_br_maker = b.add_str_column(C, "brands", "maker", topic="maker",
                                   values=b.sample(b.pool("maker", 0, 85), 60))

    # near-threshold decoy FKs with unrelated names: their value overlap sits
    # just below the joinability ground-truth bar, confusing Jaccard ranking
    # (Aurum) but not the name-aware D3L or containment-based CMDL
    b.add_str_column(C, "comedications", "comed_ref", topic="drug",
                     values=np.concatenate([b.sample(active, 52),
                                            b.sample(drug_pool[150:], 14)]))
    cat("comedications", "severity", "severity", 62)
    b.add_str_column(C, "registry", "substance_code", topic="drug",
                     values=np.concatenate([b.sample(active, 48),
                                            b.sample(drug_pool[150:], 12)]))
    b.add_num_column(C, "registry", "entry_no", lo=1, hi=9000, n=56, integer=True)

    for fk, pk in [
        (fk_enz_drug, pk_drug), (fk_int_a, pk_drug), (fk_int_b, pk_drug),
        (fk_gene_drug, pk_drug), (fk_prot_gene, pk_gene), (fk_path_prot, pk_prot),
        (fk_ind_drug, pk_drug), (fk_ind_dis, pk_dis), (fk_trial_drug, pk_drug),
        (fk_dos_drug, pk_drug), (fk_dm_drug, pk_drug), (fk_dm_mfr, pk_mfr),
        (fk_ev_drug, pk_drug), (fk_salt_drug, pk_drug),
        (fk_pr_drug, pk_drug), (fk_rc_drug, pk_drug), (fk_sh_drug, pk_drug),
        (fk_lb_drug, pk_drug), (fk_br_drug, pk_drug),
        # semantically real joins with dissimilar / shared names — part of
        # the *manual* DrugBank ground truth (no schema constraints exist)
        (fk_br_maker, pk_mfr), ("labels.formula", "salts.formula"),
    ]:
        b.add_pkfk(C, fk, pk)

    # ---------------- chembl (MySQL, 41% numeric) --------------------------
    M = "chembl"
    b.add_collection(M, "MySQL")
    comp_pool = b.pool("compound", 0, 400)
    pk_comp = b.add_str_column(M, "compounds", "compound_id", topic="compound",
                               values=comp_pool)
    b.add_num_column(M, "compounds", "mw", lo=50, hi=1200, n=400)
    b.add_num_column(M, "compounds", "alogp", lo=-3, hi=8, n=400)

    pk_assay = b.add_str_column(M, "assays", "assay_id", topic="assay",
                                values=b.pool("assay", 0, 150))
    fk_assay_comp = b.add_str_column(M, "assays", "compound_id", topic="compound",
                                     values=b.sample(comp_pool, 90))
    b.add_num_column(M, "assays", "value", lo=0, hi=100, n=150)
    b.add_str_column(M, "assays", "assay_type", topic="assaytype",
                     values=rng.choice(b.pool("assaytype"), size=150))

    # dirty FKs on activities → containment < threshold → recall misses
    act_comp = list(b.sample(comp_pool, 50)) + [f"excmp{i:04d}" for i in range(40)]
    fk_act_comp = b.add_str_column(M, "activities", "compound_id", topic="compound",
                                   values=np.array(act_comp))
    act_assay = list(b.sample(b.pool("assay", 0, 150), 40)) + [f"exassay{i:04d}" for i in range(30)]
    fk_act_assay = b.add_str_column(M, "activities", "assay_id", topic="assay",
                                    values=np.array(act_assay))
    b.add_num_column(M, "activities", "standard_value", lo=0, hi=10000, n=300)
    b.add_str_column(M, "activities", "standard_relation", topic="relation",
                     values=rng.choice(b.pool("relation"), size=300))

    pk_tgt = b.add_str_column(M, "targets", "target_id", topic="targetname",
                              values=b.pool("targetname", 0, 150))
    b.add_str_column(M, "targets", "organism", topic="organism",
                     values=rng.choice(b.pool("organism", 0, 35), size=150))

    fk_tc_tgt = b.add_str_column(M, "target_components", "target_id", topic="targetname",
                                 values=b.sample(b.pool("targetname", 0, 150), 130))
    b.add_str_column(M, "target_components", "protein_id", topic="protein",
                     values=b.sample(b.pool("protein"), 120))

    pk_dockey = b.add_str_column(M, "doc_refs", "doc_key", topic="journal",
                                 values=b.pool("journal", 0, 55))
    b.add_num_column(M, "doc_refs", "year", lo=1990, hi=2023, n=55, integer=True)

    fk_cr_comp = b.add_str_column(M, "compound_records", "compound_id", topic="compound",
                                  values=b.sample(comp_pool, 280))
    fk_cr_doc = b.add_str_column(M, "compound_records", "doc_key", topic="journal",
                                 values=b.sample(b.pool("journal", 0, 55), 45))
    b.add_num_column(M, "compound_records", "record_no", lo=1, hi=5000, n=280, integer=True)

    # schema-less semantic joins (≡ ChEMBL's "semantically reasonable joins
    # not in the schema" [31]) — near-unique compound columns with
    # dissimilar names. Aurum links them all (Jaccard high), CMDL's
    # schema-name filter rejects them; none are in the schema GT.
    b.add_str_column(M, "molecule_hierarchy", "parent_molregno", topic="compound",
                     values=b.sample(comp_pool, 370))
    b.add_str_column(M, "molecule_hierarchy", "child_molregno", topic="compound",
                     values=b.sample(comp_pool, 350))
    b.add_num_column(M, "molecule_hierarchy", "level_no", lo=1, hi=5, n=370, integer=True)
    b.add_str_column(M, "metabolism", "substrate_molregno", topic="compound",
                     values=b.sample(comp_pool, 360))
    b.add_str_column(M, "metabolism", "met_enzyme", topic="enzyme",
                     values=b.sample(b.pool("enzyme"), 90))
    b.add_num_column(M, "metabolism", "rate", lo=0, hi=10, n=360)
    b.add_str_column(M, "formulations", "ingredient_molregno", topic="compound",
                     values=b.sample(comp_pool, 340))
    b.add_str_column(M, "formulations", "ingredient_name", topic="ingredient",
                     values=b.sample(b.pool("ingredient"), 90))
    b.add_num_column(M, "formulations", "amount", lo=0.1, hi=100, n=340)

    for fk, pk in [
        (fk_assay_comp, pk_comp), (fk_act_comp, pk_comp), (fk_act_assay, pk_assay),
        (fk_tc_tgt, pk_tgt), (fk_cr_comp, pk_comp), (fk_cr_doc, pk_dockey),
    ]:
        b.add_pkfk(M, fk, pk)

    # ---------------- chebi (MySQL, numeric keys) --------------------------
    E = "chebi"
    b.add_collection(E, "MySQL")
    pk_chebi = b.add_num_column(E, "chebi_compounds", "chebi_id",
                                lo=1, hi=3201, n=3200, unique=True, integer=True)
    b.add_str_column(E, "chebi_compounds", "name", topic="chebiname",
                     values=b.pool("chebiname", 0, 150))
    b.add_num_column(E, "chebi_compounds", "mass", lo=10, hi=900, n=300)
    fk_rel_init = b.add_num_column(E, "chebi_relations", "init_id",
                                   lo=1, hi=3000, n=260, integer=True, dup_frac=0.15)
    fk_rel_final = b.add_num_column(E, "chebi_relations", "final_id",
                                    lo=100, hi=3100, n=240, integer=True, dup_frac=0.15)
    b.add_str_column(E, "chebi_relations", "rel_type", topic="relation",
                     values=rng.choice(b.pool("relation"), size=260))
    # dirty numeric FKs whose ranges extend well past the PK domain →
    # overlap relative to the smaller span < threshold → missed (recall)
    fk_names_ref = b.add_num_column(E, "chebi_names", "chebi_id_ref",
                                    lo=1, hi=9500, n=280, integer=True, dup_frac=0.15)
    b.add_str_column(E, "chebi_names", "synonym", topic="chebiname",
                     values=b.pool("chebiname", 150, 300))
    fk_orig_ref = b.add_num_column(E, "chebi_origins", "chebi_id2",
                                   lo=1, hi=11000, n=200, integer=True, dup_frac=0.15)
    # spurious numeric key inside the PK range → false positive for both
    b.add_num_column(E, "chebi_origins", "origin_id",
                     lo=200, hi=1001, n=800, unique=True, integer=True)
    for fk, pk in [(fk_rel_init, pk_chebi), (fk_rel_final, pk_chebi),
                   (fk_names_ref, pk_chebi), (fk_orig_ref, pk_chebi)]:
        b.add_pkfk(E, fk, pk)

    # ---------------- pubmed documents (Text) ------------------------------
    P = "pubmed"
    b.add_collection(P, "Text", is_text=True)
    cite_plans = [
        # (topic ctx, [(col to cite, n)], semantic-only cols)
        ("drug", [("drugs.drug_name", 2), ("drugs.drug_id", 1)], []),
        ("enzyme", [("enzyme_targets.enzyme_name", 2), ("drugs.drug_name", 1)],
         ["enzyme_targets.enzyme_id"]),
        ("gene", [("gene_targets.gene_name", 2), ("drugs.drug_name", 1)],
         ["gene_targets.gene_id"]),
        ("disease", [("diseases.disease_name", 2), ("indications.disease_id", 1)], []),
        ("protein", [("proteins.protein_id", 2)], ["pathways.protein_id"]),
        ("drug", [("adverse_events.event_id", 2), ("drugs.drug_name", 1)], []),
        ("compound", [], ["compounds.compound_id", "compound_records.compound_id"]),
    ]
    for i in range(220):
        topic, cites, sem = cite_plans[i % len(cite_plans)]
        b.add_doc(P, f"pm{i:04d}", f"report on {topic} studies {i}",
                  cite=cites, ctx=[(topic, 4)], semantic_links=sem,
                  noise=4, chatter=5)

    # ---------------- drugbank-synthetic (union benchmark 3B) --------------
    S = "drugbank_synth"
    b.add_collection(S, "CSV")
    for i, (base, grp) in enumerate([("drugs", "g1"), ("enzyme_targets", "g2"),
                                     ("gene_targets", "g3"), ("diseases", "g4"),
                                     ("adverse_events", "g5")]):
        b.add_union_variants(S, base, 3, group=grp, rename="synonym",
                             synonym_map=PHARMA_SYNONYMS, row_frac=0.5,
                             drop_numeric=True, value_noise_frac=0.7)
    return b.build()



def ukopen_lake(seed: int = 22) -> Lake:
    b = LakeBuilder("ukopen", seed)
    rng = b.rng
    for t, n in [("city", 280), ("region", 80), ("school", 360), ("schoolname", 360),
                 ("refcode", 160),
                 ("road", 280), ("roadname", 280), ("council", 110),
                 ("councilname", 110), ("dept", 130), ("budgetcat", 45),
                 ("ward", 260), ("street", 300), ("business", 360),
                 ("businessname", 300), ("property", 420), ("crime", 120),
                 ("gp", 240), ("site", 90), ("licensetype", 6)]:
        b.add_topic(t, n)

    G = "govt"
    b.add_collection(G, "CSV")
    city = b.pool("city")

    school_ids = b.pool("school", 0, 320)
    b.add_str_column(G, "schools", "school_id", topic="school", values=school_ids)
    b.add_str_column(G, "schools", "school_name", topic="schoolname",
                     values=b.pool("schoolname", 0, 320))
    b.add_str_column(G, "schools", "city", topic="city",
                     values=np.concatenate([b.sample(city[:25], 12),
                                            b.sample(city[25:95], 60),
                                            b.sample(b.pool("refcode"), 40)]))
    b.add_num_column(G, "schools", "capacity", lo=100, hi=2000, n=320, integer=True)

    b.add_str_column(G, "school_results", "school_ref", topic="school",
                     values=b.sample(school_ids, 180))
    b.add_num_column(G, "school_results", "year", lo=2010, hi=2023, n=180, integer=True)
    b.add_num_column(G, "school_results", "score", lo=0, hi=100, n=180)

    b.add_str_column(G, "school_meals", "school", topic="school",
                     values=b.sample(b.pool("school", 200, 360), 130))
    b.add_str_column(G, "school_meals", "city", topic="city",
                     values=np.concatenate([b.sample(city[:25], 12),
                                            b.sample(city[95:160], 55)]))
    b.add_num_column(G, "school_meals", "cost", lo=1, hi=5, n=140)

    road_ids = b.pool("road", 0, 260)
    b.add_str_column(G, "roads", "road_id", topic="road", values=road_ids)
    b.add_str_column(G, "roads", "road_name", topic="roadname",
                     values=b.pool("roadname", 0, 260))
    b.add_str_column(G, "roads", "region", topic="region", values=b.sample(b.pool("region"), 60))
    b.add_num_column(G, "roads", "length_km", lo=0.1, hi=80, n=260)

    b.add_str_column(G, "road_works", "road_ref", topic="road",
                     values=b.sample(b.pool("road", 100, 280), 130))
    b.add_num_column(G, "road_works", "cost", lo=1000, hi=500000, n=150)
    b.add_str_column(G, "road_works", "dept", topic="dept",
                     values=np.concatenate([b.sample(b.pool("dept"), 45),
                                            b.sample(b.pool("refcode"), 25)]))

    council_ids = b.pool("council", 0, 100)
    b.add_str_column(G, "councils", "council_id", topic="council", values=council_ids)
    b.add_str_column(G, "councils", "council_name", topic="councilname",
                     values=b.pool("councilname", 0, 100))
    b.add_str_column(G, "councils", "region", topic="region", values=b.sample(b.pool("region"), 70))

    b.add_str_column(G, "council_spending", "council_ref", topic="council",
                     values=b.sample(council_ids, 85))
    b.add_num_column(G, "council_spending", "amount", lo=100, hi=1000000, n=85)
    b.add_str_column(G, "council_spending", "category", topic="budgetcat",
                     values=rng.choice(b.pool("budgetcat"), size=85))

    ward_ids = b.pool("ward", 0, 190)
    b.add_str_column(G, "wards", "ward_id", topic="ward",
                     values=np.concatenate([b.sample(ward_ids, 120),
                                            b.sample(b.pool("refcode"), 40)]))
    b.add_str_column(G, "wards", "council_ref", topic="council",
                     values=b.sample(b.pool("council", 40, 110), 60))
    b.add_num_column(G, "wards", "population", lo=1000, hi=30000, n=190, integer=True)

    biz_ids = b.pool("business", 0, 290)
    b.add_str_column(G, "businesses", "business_id", topic="business", values=biz_ids)
    b.add_str_column(G, "businesses", "business_name", topic="businessname",
                     values=b.pool("businessname", 0, 290))
    b.add_str_column(G, "businesses", "city", topic="city",
                     values=np.concatenate([b.sample(city[:25], 12),
                                            b.sample(city[160:235], 65)]))
    b.add_num_column(G, "businesses", "rates", lo=500, hi=100000, n=290)

    b.add_str_column(G, "licenses", "license_id", topic="crime",
                     values=np.concatenate([b.pool("crime", 0, 55),
                                            b.sample(b.pool("refcode"), 38)]))
    b.add_str_column(G, "licenses", "business_ref", topic="business",
                     values=b.sample(b.pool("business", 100, 300), 110))
    b.add_str_column(G, "licenses", "type", topic="licensetype",
                     values=rng.choice(b.pool("licensetype"), size=140))

    b.add_str_column(G, "properties", "property_id", topic="property",
                     values=b.pool("property", 0, 330))
    b.add_str_column(G, "properties", "street", topic="street",
                     values=np.concatenate([b.sample(b.pool("street"), 180),
                                            b.sample(b.pool("refcode"), 45)]))
    b.add_str_column(G, "properties", "city", topic="city",
                     values=np.concatenate([b.sample(city[:25], 12),
                                            b.sample(city[35:100], 55)]))
    b.add_num_column(G, "properties", "value", lo=50000, hi=2000000, n=330)

    b.add_str_column(G, "gp_practices", "gp_id", topic="gp", values=b.pool("gp", 0, 170))
    b.add_str_column(G, "gp_practices", "city", topic="city",
                     values=np.concatenate([b.sample(city[:25], 10),
                                            b.sample(city[235:280], 40),
                                            b.sample(b.pool("refcode"), 36)]))
    b.add_num_column(G, "gp_practices", "patients", lo=500, hi=20000, n=170, integer=True)

    b.add_str_column(G, "markets", "market_id", topic="crime",
                     values=b.pool("crime", 60, 120))
    b.add_str_column(G, "markets", "city", topic="city",
                     values=np.concatenate([b.sample(city[:25], 12),
                                            b.sample(city[120:180], 50)]))
    b.add_str_column(G, "libraries", "library_id", topic="gp",
                     values=b.pool("gp", 100, 180))
    b.add_str_column(G, "libraries", "city", topic="city",
                     values=np.concatenate([b.sample(city[:25], 12),
                                            b.sample(city[60:120], 48)]))
    b.add_str_column(G, "air_quality", "site", topic="site",
                     values=np.concatenate([b.pool("site", 0, 66),
                                            b.sample(b.pool("refcode"), 28)]))
    b.add_str_column(G, "air_quality", "region", topic="region",
                     values=b.sample(b.pool("region"), 55))
    b.add_num_column(G, "air_quality", "no2", lo=5, hi=80, n=88)
    b.add_num_column(G, "air_quality", "pm10", lo=2, hi=50, n=88)

    # disjoint-slice family members: drawn from the same domains as the
    # families above but from non-overlapping value ranges — a manual
    # annotator marks them joinable, syntactic measures cannot find them
    b.add_str_column(G, "closed_schools", "urn", topic="school",
                     values=b.pool("school", 330, 360))
    b.add_str_column(G, "closed_schools", "locality", topic="city",
                     values=b.sample(city[250:280], 25))
    b.add_str_column(G, "historic_roads", "route", topic="road",
                     values=b.pool("road", 260, 280))
    b.add_str_column(G, "former_councils", "authority", topic="council",
                     values=b.pool("council", 100, 110))
    b.add_str_column(G, "former_councils", "area", topic="region",
                     values=b.sample(b.pool("region"), 30))
    b.add_str_column(G, "old_wards", "division", topic="ward",
                     values=b.pool("ward", 190, 260))
    b.add_str_column(G, "demolished_props", "uprn", topic="property",
                     values=b.pool("property", 340, 420))
    b.add_str_column(G, "defunct_businesses", "entity_no", topic="business",
                     values=b.pool("business", 300, 360))
    b.add_str_column(G, "old_streets", "thoroughfare", topic="street",
                     values=b.pool("street", 240, 300))
    b.add_str_column(G, "retired_gps", "practice_code", topic="gp",
                     values=b.pool("gp", 180, 240))

    # homograph decoy columns (cf. DomainNet [44]): code columns that
    # coincidentally share a slice of another domain's value space under an
    # unrelated name — they are NOT annotated joinable, and their Jaccard
    # similarity to the annotated pairs' columns rivals the true pairs'
    # while their containment stays below them
    def homograph(table, column, pool_vals, n_shared, n_noise, tag):
        vals = np.concatenate([
            b.sample(pool_vals, n_shared),
            np.array([f"x{tag}{i:04d}" for i in range(n_noise)])])
        b.add_str_column(G, table, column, topic=f"hg_{tag}", values=vals)

    homograph("meal_plans", "subsidy_code", b.pool("school", 200, 330), 60, 35, "sub")
    homograph("payees", "payee_code", b.pool("council", 40, 110), 55, 30, "pay")
    homograph("route_logs", "stretch_code", b.pool("road", 100, 260), 60, 30, "str")
    homograph("zone_audits", "zone_code", b.pool("region"), 45, 25, "zon")
    homograph("asset_registers", "asset_code", b.pool("ward", 0, 150), 60, 30, "ast")

    # mirror tables: semantically indistinguishable from an existing group
    # (same topics) under different headers — see DESIGN.md §Table 5
    b.add_str_column(G, "colleges", "college_code", topic="school",
                     values=b.sample(b.pool("school", 200, 360), 130))
    b.add_str_column(G, "colleges", "college_title", topic="schoolname",
                     values=b.sample(b.pool("schoolname", 200, 360), 130))
    b.add_str_column(G, "colleges", "town", topic="city",
                     values=np.concatenate([b.sample(city[:25], 10),
                                            b.sample(city[100:160], 45)]))
    b.add_num_column(G, "colleges", "enrolment", lo=200, hi=8000, n=130, integer=True)
    b.add_str_column(G, "motorways", "mway_no", topic="road",
                     values=b.sample(b.pool("road", 150, 280), 100))
    b.add_str_column(G, "motorways", "mway_label", topic="roadname",
                     values=b.sample(b.pool("roadname", 150, 280), 100))
    b.add_num_column(G, "motorways", "lanes", lo=2, hi=6, n=100, integer=True)
    b.add_str_column(G, "agencies", "agency_no", topic="council",
                     values=b.sample(b.pool("council", 60, 110), 45))
    b.add_str_column(G, "agencies", "zone", topic="region",
                     values=b.sample(b.pool("region"), 50))

    # union variants (benchmark 3A): light renames keep name tokens shared
    for i, base in enumerate(["schools", "roads", "councils", "businesses",
                              "properties", "wards", "gp_practices", "air_quality",
                              "colleges", "motorways", "agencies"]):
        b.add_union_variants(G, base, 3, group=f"u{i}", rename="light",
                             row_frac=0.55, drop_numeric=True,
                             value_noise_frac=0.35)

    # synthetic text documents (benchmark 1A)
    T = "synthtext"
    b.add_collection(T, "Text", is_text=True)
    plans = [
        ("school", [("schools.school_name", 2), ("schools.city", 1)],
         ["school_results.school_ref"]),
        ("road", [("roads.road_name", 2)], ["road_works.road_ref"]),
        ("council", [("councils.council_name", 2), ("council_spending.council_ref", 1)], []),
        ("business", [("businesses.business_name", 2), ("businesses.city", 1)],
         ["licenses.business_ref"]),
        ("city", [("properties.street", 2), ("properties.city", 1)], []),
        ("ward", [("wards.ward_id", 2)], ["wards.council_ref"]),
        ("gp", [("gp_practices.gp_id", 2), ("gp_practices.city", 1)], []),
        ("region", [("air_quality.site", 2)], ["air_quality.region"]),
    ]
    for i in range(240):
        topic, cites, sem = plans[i % len(plans)]
        # titles reference the source table for half the documents —
        # a medium-quality metadata signal, as in real open-data portals
        src = cites[0][0].split(".")[0].replace("_", " ") if cites else topic
        title = (f"open data {src} {topic} notes {i}" if i % 2 == 0
                 else f"open data {topic} notes {i}")
        b.add_doc(T, f"uk{i:04d}", title,
                  cite=cites, ctx=[(topic, 3)], semantic_links=sem,
                  noise=4, chatter=4)
    return b.build()


def mlopen_lake(seed: int = 33) -> Lake:
    b = LakeBuilder("mlopen", seed)
    rng = b.rng
    for t, n in [("movie", 320), ("movietitle", 320), ("user", 260),
                 ("product", 340), ("productname", 340), ("brand", 90),
                 ("actor", 290), ("actorname", 290), ("director", 190),
                 ("mcity", 150), ("cinema", 80), ("uid", 2600),
                 ("genre", 8), ("seller", 180), ("tag", 120)]:
        b.add_topic(t, n)

    # ---------------- Small Scale: similar cardinalities (mQCR ~.7) --------
    S = "ss"
    b.add_collection(S, "CSV")
    movies_s = b.pool("movie", 0, 130)
    b.add_str_column(S, "movies_s", "movie_id", topic="movie", values=b.sample(movies_s, 120))
    b.add_str_column(S, "movies_s", "title", topic="movietitle",
                     values=b.pool("movietitle", 0, 120))
    b.add_str_column(S, "movies_s", "genre", topic="genre",
                     values=rng.choice(b.pool("genre"), size=120))
    b.add_num_column(S, "movies_s", "year", lo=1960, hi=2023, n=120, integer=True)
    b.add_str_column(S, "ratings_s", "movie_ref", topic="movie", values=b.sample(movies_s, 95))
    b.add_str_column(S, "ratings_s", "user_id", topic="user", values=b.sample(b.pool("user"), 110))
    b.add_num_column(S, "ratings_s", "stars", lo=1, hi=5, n=110)
    b.add_str_column(S, "watchlists_s", "movie_id", topic="movie", values=b.sample(movies_s, 90))
    b.add_str_column(S, "watchlists_s", "user_ref", topic="user", values=b.sample(b.pool("user"), 100))
    actors_s = b.pool("actor", 0, 150)
    b.add_str_column(S, "actors_s", "actor_id", topic="actor", values=b.sample(actors_s, 140))
    b.add_str_column(S, "actors_s", "actor_name", topic="actorname",
                     values=b.pool("actorname", 0, 140))
    b.add_str_column(S, "cast_s", "movie_id", topic="movie", values=b.sample(movies_s, 85))
    b.add_str_column(S, "cast_s", "actor_ref", topic="actor", values=b.sample(actors_s, 120))
    dirs_s = b.pool("director", 0, 110)
    b.add_str_column(S, "directors_s", "director_id", topic="director", values=b.sample(dirs_s, 100))
    b.add_str_column(S, "directors_s", "city", topic="mcity", values=b.sample(b.pool("mcity"), 60))
    b.add_str_column(S, "film_dir_s", "movie_id", topic="movie", values=b.sample(movies_s, 80))
    b.add_str_column(S, "film_dir_s", "director_ref", topic="director", values=b.sample(dirs_s, 85))
    b.add_str_column(S, "cinemas_s", "cinema_id", topic="cinema", values=b.pool("cinema", 0, 70))
    b.add_str_column(S, "cinemas_s", "city", topic="mcity", values=b.sample(b.pool("mcity"), 55))
    # near-threshold decoys: value overlap just below the joinability bar
    b.add_str_column(S, "screenings_s", "film_code", topic="movie",
                     values=np.concatenate([b.sample(movies_s, 55),
                                            b.sample(b.pool("movie", 130, 320), 35)]))
    b.add_str_column(S, "promos_s", "feature_ref", topic="movie",
                     values=np.concatenate([b.sample(movies_s, 50),
                                            b.sample(b.pool("movie", 130, 320), 32)]))
    b.add_str_column(S, "badges_s", "badge_code", topic="hg_badge",
                     values=np.concatenate([b.sample(movies_s, 85),
                                            np.array([f"xbdg{i:04d}" for i in range(28)])]))
    b.add_str_column(S, "passes_s", "pass_no", topic="hg_pass",
                     values=np.concatenate([b.sample(b.pool("user", 0, 150), 80),
                                            np.array([f"xpss{i:04d}" for i in range(30)])]))
    b.add_str_column(S, "guests_s", "visitor", topic="user",
                     values=np.concatenate([b.sample(b.pool("user", 0, 150), 60),
                                            b.sample(b.pool("user", 150, 260), 40)]))

    # ---------------- Medium Scale: moderate skew (mQCR ~.45) --------------
    M = "ms"
    b.add_collection(M, "CSV")
    prods = b.pool("product", 0, 330)
    b.add_str_column(M, "products_m", "product_id", topic="product", values=prods)
    b.add_str_column(M, "products_m", "product_name", topic="productname",
                     values=b.pool("productname", 0, 330))
    b.add_str_column(M, "products_m", "brand", topic="brand", values=b.sample(b.pool("brand"), 80))
    b.add_num_column(M, "products_m", "price", lo=1, hi=2000, n=330)
    b.add_str_column(M, "orders_m", "product_ref", topic="product", values=b.sample(prods, 150))
    b.add_str_column(M, "orders_m", "user_id", topic="user", values=b.sample(b.pool("user"), 180))
    b.add_num_column(M, "orders_m", "qty", lo=1, hi=20, n=180, integer=True)
    b.add_str_column(M, "inventory_m", "product_id", topic="product", values=b.sample(prods, 140))
    b.add_str_column(M, "inventory_m", "seller", topic="seller", values=b.sample(b.pool("seller"), 100))
    b.add_num_column(M, "inventory_m", "stock", lo=0, hi=1000, n=140, integer=True)
    b.add_str_column(M, "returns_m", "product_ref", topic="product", values=b.sample(prods, 110))
    b.add_num_column(M, "returns_m", "refund", lo=1, hi=2000, n=110)
    b.add_str_column(M, "sellers_m", "seller_id", topic="seller", values=b.pool("seller", 0, 170))
    b.add_str_column(M, "sellers_m", "city", topic="mcity", values=b.sample(b.pool("mcity"), 90))
    movies_m = b.pool("movie", 100, 320)
    b.add_str_column(M, "movies_m", "movie_id", topic="movie", values=movies_m)
    b.add_str_column(M, "movies_m", "title", topic="movietitle",
                     values=b.pool("movietitle", 100, 320))
    b.add_num_column(M, "movies_m", "runtime", lo=60, hi=220, n=220, integer=True)
    b.add_str_column(M, "reviews_m", "movie_ref", topic="movie", values=b.sample(movies_m, 100))
    b.add_str_column(M, "reviews_m", "user_id", topic="user", values=b.sample(b.pool("user"), 130))
    b.add_num_column(M, "reviews_m", "score", lo=0, hi=10, n=130)
    b.add_str_column(M, "tags_m", "movie_id", topic="movie", values=b.sample(movies_m, 90))
    b.add_str_column(M, "tags_m", "tag", topic="tag", values=b.sample(b.pool("tag"), 110))
    b.add_str_column(M, "wishlist_m", "product_id", topic="product", values=b.sample(prods, 95))
    b.add_str_column(M, "wishlist_m", "user_ref", topic="user", values=b.sample(b.pool("user"), 120))
    b.add_str_column(M, "actors_m", "actor_id", topic="actor", values=b.pool("actor", 100, 290))
    b.add_str_column(M, "actors_m", "name", topic="actorname",
                     values=b.pool("actorname", 100, 290))
    b.add_str_column(M, "cast_m", "movie_id", topic="movie", values=b.sample(movies_m, 85))
    b.add_str_column(M, "cast_m", "actor_ref", topic="actor",
                     values=b.sample(b.pool("actor", 100, 290), 95))
    b.add_str_column(M, "coupons_m", "coupon_code", topic="hg_coupon",
                     values=np.concatenate([b.sample(prods[:180], 62),
                                            np.array([f"xcpn{i:04d}" for i in range(30)])]))
    b.add_str_column(M, "royalties_m", "work_code", topic="hg_work",
                     values=np.concatenate([b.sample(movies_m[:140], 58),
                                            np.array([f"xwrk{i:04d}" for i in range(28)])]))
    b.add_str_column(M, "clearance_m", "item_code", topic="product",
                     values=np.concatenate([b.sample(prods, 60),
                                            np.array([f"xitem{i:04d}" for i in range(45)])]))
    b.add_str_column(M, "archive_m", "film_ref", topic="movie",
                     values=np.concatenate([b.sample(movies_m, 55),
                                            b.sample(b.pool("movie", 0, 100), 40)]))

    # ---------------- Large Scale: heavy skew + numeric-heavy (mQCR ~.02) --
    L = "ls"
    b.add_collection(L, "CSV")
    uids = b.pool("uid")
    b.add_str_column(L, "users_l", "user_id", topic="uid", values=uids[:2400])
    b.add_num_column(L, "users_l", "age", lo=18, hi=90, n=2400, integer=True)
    b.add_num_column(L, "users_l", "income", lo=10000, hi=200000, n=2400)
    b.add_num_column(L, "users_l", "signup_ts", lo=1.4e9, hi=1.7e9, n=2400)
    b.add_str_column(L, "sessions_l", "user_ref", topic="uid", values=b.sample(uids[:300], 60))
    b.add_num_column(L, "sessions_l", "duration", lo=1, hi=7200, n=60)
    b.add_num_column(L, "sessions_l", "pages", lo=1, hi=100, n=60, integer=True)
    b.add_str_column(L, "purchases_l", "user_id", topic="uid", values=b.sample(uids[:300], 55))
    b.add_num_column(L, "purchases_l", "amount", lo=1, hi=5000, n=55)
    b.add_num_column(L, "purchases_l", "items", lo=1, hi=30, n=55, integer=True)
    b.add_str_column(L, "churn_l", "user_ref", topic="uid", values=b.sample(uids[:300], 50))
    b.add_num_column(L, "churn_l", "tenure", lo=0, hi=120, n=50)
    b.add_num_column(L, "churn_l", "risk", lo=0, hi=1, n=50)
    b.add_str_column(L, "events_l", "user_id", topic="uid",
                     values=rng.choice(uids[:2000], size=2600))
    b.add_num_column(L, "events_l", "event_ts", lo=1.5e9, hi=1.7e9, n=2600)
    b.add_num_column(L, "events_l", "event_type", lo=1, hi=40, n=2600, integer=True)
    b.add_str_column(L, "devices_l", "user_ref", topic="uid", values=b.sample(uids[:300], 65))
    b.add_num_column(L, "devices_l", "os_ver", lo=8, hi=17, n=65)
    b.add_num_column(L, "devices_l", "screen", lo=4, hi=13, n=65)
    b.add_str_column(L, "support_l", "user_id", topic="uid", values=b.sample(uids[:300], 45))
    b.add_num_column(L, "support_l", "tickets", lo=1, hi=50, n=45, integer=True)
    b.add_num_column(L, "support_l", "csat", lo=1, hi=5, n=45)

    # ---------------- reviews documents (benchmark 1C) ---------------------
    R = "reviews"
    b.add_collection(R, "Text", is_text=True)
    plans = [
        ("product", [("products_m.product_name", 2), ("products_m.brand", 1)],
         ["orders_m.product_ref"]),
        ("movie", [("movies_m.title", 2)], ["reviews_m.movie_ref"]),
        ("actor", [("actors_m.name", 2), ("movies_m.title", 1)], []),
        ("seller", [("sellers_m.seller_id", 2)], ["inventory_m.seller"]),
        ("tag", [("tags_m.tag", 2), ("movies_m.title", 1)], []),
        ("product", [], ["products_m.product_id", "wishlist_m.product_id"]),
    ]
    for i in range(150):
        topic, cites, sem = plans[i % len(plans)]
        b.add_doc(R, f"rv{i:04d}", f"customer {topic} review {i}",
                  cite=cites, ctx=[(topic, 3)], semantic_links=sem,
                  noise=5, chatter=4)
    return b.build()


def build_lake(name: str, seed: int | None = None) -> Lake:
    """Registry: build one of the three lakes by name."""
    builders = {"pharma": pharma_lake, "ukopen": ukopen_lake, "mlopen": mlopen_lake}
    fn = builders[name]
    return fn() if seed is None else fn(seed)


ALL_LAKES = ("pharma", "ukopen", "mlopen")
