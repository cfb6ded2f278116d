"""End-to-end joint-representation pipeline (§4, Figs. 3-5).

``build_training_dataset`` runs the weak-supervision stage: sample DEs,
probe the four LF indexes, fit the generative label model, optionally
apply gold-label LF elimination, then train the discriminator to emit a
relatedness degree in [0,1] for every sampled (doc, col) pair.

``train_joint_model`` runs the representation stage: mini batches →
aggregated hard triplets → triplet-margin MLP until the epoch loss
converges. ``apply_joint`` embeds every DE into the joint space and
stores the result on the profile (feeding the indexing framework, as in
Fig. 2).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.joint.minibatch import make_minibatches
from repro.joint.model import TripletMLP
from repro.joint.triplets import generate_triplets
from repro.sketch.minhash import est_containment
from repro.sketch.profiler import Profile
from repro.weak.gold import lf_accuracies, select_lfs
from repro.weak.label_model import Discriminator, GenerativeModel
from repro.weak.labeling import (LF_NAMES, LabelingContext,
                                 build_labeling_context, label_matrix)


@dataclass
class TrainingData:
    """Weakly-labeled training dataset plus diagnostics."""

    pairs: pd.DataFrame                      # doc_id, col_id, rel
    lfs_used: tuple[str, ...]
    generative: GenerativeModel
    discriminator: Discriminator
    gold_accuracies: pd.Series | None = None
    sampled_docs: list[str] = field(default_factory=list)
    sampled_cols: list[str] = field(default_factory=list)

    def rel_lookup(self) -> dict[tuple[str, str], float]:
        return {(r.doc_id, r.col_id): r.rel for r in self.pairs.itertuples()}


def pair_features(profile: Profile, ctx: LabelingContext, doc_ids: list[str],
                  col_ids: list[str]) -> np.ndarray:
    """Similarity features for (doc × col) pairs, row-major in doc then col."""
    feats = np.zeros((len(doc_ids) * len(col_ids), 4))
    col_pos = {c: i for i, c in enumerate(col_ids)}
    for di, d in enumerate(doc_ids):
        base = di * len(col_ids)
        dv = profile.content_vecs.get(d)
        mv = profile.meta_vecs.get(d)
        dsig = profile.doc_token_sigs.get(d)
        bm = dict(ctx.bm25_content.query(ctx.doc_tokens.get(d, []),
                                         k=len(ctx.col_ids)))
        for c in col_ids:
            i = base + col_pos[c]
            cv = profile.content_vecs.get(c)
            cm = profile.meta_vecs.get(c)
            if dv is not None and cv is not None:
                feats[i, 0] = _cos(dv, cv)
            if mv is not None and cm is not None:
                feats[i, 1] = _cos(mv, cm)
            csig = profile.col_token_sigs.get(c)
            if dsig and csig:
                feats[i, 2] = est_containment(dsig[0], dsig[1], csig[0], csig[1])
            s = bm.get(c, 0.0)
            feats[i, 3] = s / (1.0 + s)
    return feats


def _cos(a: np.ndarray, b: np.ndarray) -> float:
    na, nb = np.linalg.norm(a), np.linalg.norm(b)
    return float(a @ b / (na * nb)) if na and nb else 0.0


def build_training_dataset(profile: Profile, doc_ids: list[str], col_ids: list[str],
                           *, sample_frac: float = 0.5, k: int = 10, seed: int = 0,
                           gold: pd.DataFrame | None = None,
                           gold_ratio: float = 0.5,
                           ctx: LabelingContext | None = None) -> TrainingData:
    """Weak-supervision stage: LF votes → generative model → discriminator."""
    rng = np.random.default_rng(seed)
    ctx = ctx or build_labeling_context(profile, col_ids, doc_ids)
    n_d = max(4, int(sample_frac * len(doc_ids)))
    n_c = max(8, int(sample_frac * len(ctx.col_ids)))
    docs = list(rng.choice(doc_ids, size=min(n_d, len(doc_ids)), replace=False))
    cols = list(rng.choice(ctx.col_ids, size=min(n_c, len(ctx.col_ids)), replace=False))

    lfs: tuple[str, ...] = LF_NAMES
    gold_accs = None
    if gold is not None and len(gold):
        gold_accs = lf_accuracies(ctx, gold, k=k)
        lfs = select_lfs(gold_accs, ratio=gold_ratio)

    pairs, votes = label_matrix(ctx, docs, cols, k=k, lfs=lfs)
    gen = GenerativeModel()
    posterior = gen.fit_predict(votes)

    feats = pair_features(profile, ctx, docs, cols)
    disc = Discriminator().fit(feats, posterior)
    rel = disc.predict_proba(feats)
    pairs = pairs.assign(rel=rel)
    return TrainingData(pairs=pairs, lfs_used=lfs, generative=gen,
                        discriminator=disc, gold_accuracies=gold_accs,
                        sampled_docs=docs, sampled_cols=cols)


@dataclass
class JointResult:
    model: TripletMLP
    losses: list[float]

    @property
    def epochs(self) -> int:
        return len(self.losses)


def train_joint_model(profile: Profile, td: TrainingData, *,
                      batch_frac: float = 0.08, margin: float = 0.2,
                      lr: float = 1e-3, hard: str | None = "avg",
                      pos_threshold: float = 0.5, max_epochs: int = 250,
                      tol: float = 1e-4, patience: int = 5,
                      seed: int = 0) -> JointResult:
    """Train the triplet-loss MLP until epoch-loss convergence (§4.2)."""
    rng = np.random.default_rng(seed)
    model = TripletMLP(margin=margin, lr=lr, seed=seed)
    rel = td.rel_lookup()
    losses: list[float] = []
    stable = 0
    for _ in range(max_epochs):
        batches = make_minibatches(td.sampled_docs, td.sampled_cols,
                                   batch_frac=batch_frac, rng=rng)
        epoch_losses = []
        for doc_chunk, col_chunk in batches:
            des = list(doc_chunk) + list(col_chunk)
            X = np.stack([profile.encode(de) for de in des])
            index = {de: i for i, de in enumerate(des)}
            Z = model.forward(X)
            triplets = generate_triplets(doc_chunk, col_chunk, rel, Z, index,
                                         pos_threshold=pos_threshold, hard=hard)
            epoch_losses.append(model.train_batch(X, triplets))
        loss = float(np.mean(epoch_losses)) if epoch_losses else 0.0
        losses.append(loss)
        if len(losses) >= 2 and abs(losses[-1] - losses[-2]) < tol:
            stable += 1
            if stable >= patience:
                break
        else:
            stable = 0
    return JointResult(model=model, losses=losses)


def apply_joint(profile: Profile, model: TripletMLP,
                de_ids: list[str] | None = None) -> None:
    """Embed DEs into the joint space and store on the profile (Fig. 2)."""
    if de_ids is None:
        de_ids = profile.doc_ids + profile.col_ids
    X = np.stack([profile.encode(de) for de in de_ids])
    Z = model.transform(X)
    for de, z in zip(de_ids, Z):
        profile.joint_vecs[de] = z
