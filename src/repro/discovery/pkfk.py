"""PK-FK join discovery (paper §5.1, evaluated in §6.2 Table 4).

One parameterized engine serves both systems:

- **CMDL**: Jaccard *set containment* FK→PK (robust to skewed FK/PK
  cardinalities), a schema-name similarity filter, and a *lenient*
  key-cardinality test (distinct ratio ≥ ``key_ratio``). The lenient
  test is exactly what the paper blames for CMDL's lower precision on
  DrugBank — near-unique non-key columns pass it.
- **Aurum**: symmetric Jaccard similarity ≥ a threshold, a *strict*
  key test, and no schema filter (the paper credits CMDL's better
  ChEMBL precision to "its use of the schema similarity filters").

Numeric columns go through a single shared numeric-overlap path used by
both systems verbatim — which is why the paper's ChEBI rows (and ours)
are identical across systems.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd

from repro.discovery.names import name_similarity
from repro.sketch.minhash import est_containment, est_jaccard
from repro.sketch.profiler import Profile
from repro.sketch.stats import range_overlap

MIN_DISTINCT = 10


@dataclass(frozen=True)
class PkfkConfig:
    """Knobs distinguishing CMDL from the Aurum baseline."""

    measure: str = "containment"     # 'containment' (CMDL) | 'jaccard' (Aurum)
    threshold: float = 0.8           # containment or Jaccard threshold
    key_ratio: float = 0.9           # min distinct ratio for the PK side
    use_name_filter: bool = True
    name_threshold: float = 0.35
    numeric_threshold: float = 0.85  # FK-range coverage by the PK range


CMDL_PKFK = PkfkConfig(measure="containment", threshold=0.8, key_ratio=0.9,
                       use_name_filter=True)
AURUM_PKFK = PkfkConfig(measure="jaccard", threshold=0.5, key_ratio=0.98,
                        use_name_filter=False)


def _numeric_links(profile: Profile, cols: pd.DataFrame, cfg: PkfkConfig) -> set[tuple[str, str]]:
    """Shared numeric PK-FK path (identical for CMDL and Aurum)."""
    stats = profile.numeric_stats
    if stats is None or len(stats) == 0:
        return set()
    num = cols[cols["dtype"] == "num"]
    links: set[tuple[str, str]] = set()
    rows = {r.col_id: r for r in num.itertuples() if r.col_id in stats.index}
    for p_id, p in rows.items():
        ps = stats.loc[p_id]
        if p.n_values == 0 or (p.n_distinct / p.n_values) < 0.98:
            continue  # strict numeric key test, shared by both systems
        if ps.get("frac_int", 1.0) < 0.99:
            continue  # keys are integer-valued; real-valued columns excluded
        for f_id, f in rows.items():
            if f_id == p_id or f.table == p.table:
                continue
            fs = stats.loc[f_id]
            if fs.get("frac_int", 1.0) < 0.99:
                continue
            f_span = fs["vmax"] - fs["vmin"]
            inter = min(fs["vmax"], ps["vmax"]) - max(fs["vmin"], ps["vmin"])
            coverage = (inter / f_span) if f_span > 0 else (
                1.0 if range_overlap(fs["vmin"], fs["vmax"], ps["vmin"], ps["vmax"]) > 0 else 0.0)
            if coverage >= cfg.numeric_threshold:
                links.add((f_id, p_id))
    return links


def discover_pkfk(profile: Profile, *, collection: str | None = None,
                  config: PkfkConfig = CMDL_PKFK) -> set[tuple[str, str]]:
    """Discover directed (fk_col_id, pk_col_id) links in a collection."""
    cols = profile.col_meta
    if collection is not None:
        cols = cols[cols["collection"] == collection]
    links: set[tuple[str, str]] = set()

    # ---- string path -------------------------------------------------------
    str_cols = [r for r in cols.itertuples()
                if r.dtype == "str" and "pkfk" in r.tags
                and r.n_distinct >= MIN_DISTINCT and r.col_id in profile.value_sigs]
    names = {r.col_id: r.column for r in str_cols}
    for p in str_cols:
        if p.n_values == 0 or (p.n_distinct / p.n_values) < config.key_ratio:
            continue
        sig_p, n_p = profile.value_sigs[p.col_id]
        for f in str_cols:
            if f.col_id == p.col_id or f.table == p.table:
                continue
            sig_f, n_f = profile.value_sigs[f.col_id]
            if config.measure == "containment":
                score = est_containment(sig_f, n_f, sig_p, n_p)
            else:
                score = est_jaccard(sig_f, sig_p)
            if score < config.threshold:
                continue
            if config.use_name_filter and name_similarity(
                    names[f.col_id], names[p.col_id]) < config.name_threshold:
                continue
            links.add((f.col_id, p.col_id))

    # ---- numeric path (shared) --------------------------------------------
    links |= _numeric_links(profile, cols, config)
    return links


def undirected(links: set[tuple[str, str]]) -> set[frozenset[str]]:
    """Canonicalize directed links to unordered pairs for scoring."""
    return {frozenset(l) for l in links}
