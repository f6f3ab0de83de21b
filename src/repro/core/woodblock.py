"""WOODBLOCK: deep-RL qd-tree construction (paper Sec 5).

Tree-structured MDP exactly as the paper defines it:

* **state** — a node's semantic description, featurised as the
  concatenation of its (normalised) range hypercube, categorical masks and
  AC bits;
* **action** — one of the candidate cuts; a cut is *legal* on a node iff
  both resulting children hold ≥ ``b_sample`` records of the construction
  sample (Sec 5.2.1) — when no cut is legal the node becomes a leaf;
* **reward** — for every internal node ``n`` with chosen cut ``p``,
  ``R((n,p)) = S(n) / (|W|·|n.records|)`` where ``S(n)`` recursively sums
  the skipped-record counts of the leaves below ``n`` (Sec 5.2.2).

Episodes repeatedly construct whole trees; PPO updates the shared
policy/value net between (batches of) episodes; the best tree seen —
measured by the sample's description-based access fraction — is deployed
(paper: "the best tree found is deployed").
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Sequence

import numpy as np
import pandas as pd

from ..rl.mlp import PolicyValueNet
from ..rl.ppo import Batch, PPOTrainer
from .description import Description
from .greedy import CutMatrix, _cut_key
from .predicates import Node as QueryNode
from .predicates import referenced_columns
from .qdtree import QdTree, TreeNode
from .schema import CATEGORICAL, TableSchema


# ------------------------------------------------------------- featurizer
@dataclass
class Featurizer:
    """Maps a node Description to the fixed-size float state vector."""

    schema: TableSchema
    ac_names: tuple[str, ...]
    dim: int = field(init=False)

    def __post_init__(self):
        d = 0
        for name, spec in self.schema.columns.items():
            d += spec.cardinality if spec.kind == CATEGORICAL else 2
        d += 2 * len(self.ac_names)
        self.dim = d

    def __call__(self, desc: Description) -> np.ndarray:
        out = np.empty(self.dim, dtype=np.float64)
        i = 0
        for name, spec in self.schema.columns.items():
            if spec.kind == CATEGORICAL:
                k = spec.cardinality
                out[i : i + k] = desc.masks[name]
                i += k
            else:
                lo, hi = spec.domain
                span = max(float(hi) - float(lo), 1e-12)
                iv = desc.ranges[name]
                out[i] = np.clip((iv.lo - lo) / span, 0.0, 1.0)
                out[i + 1] = np.clip((iv.hi - lo) / span, 0.0, 1.0)
                i += 2
        for n in self.ac_names:
            mt, mf = desc.acs[n]
            out[i], out[i + 1] = float(mt), float(mf)
            i += 2
        return out


@dataclass
class WoodblockConfig:
    """Training hyper-parameters (paper defaults scaled down)."""

    episodes: int = 40
    hidden: int = 128
    lr: float = 3e-3
    clip: float = 0.2
    ent_coef: float = 0.02
    vf_coef: float = 0.5
    epochs: int = 4
    minibatch: int = 128
    batch_episodes: int = 4  # episodes per PPO update
    max_leaves: int = 4096  # safety cap on tree size per episode
    seed: int = 0
    final_greedy_rollout: bool = True  # deterministic argmax tree at the end


@dataclass
class WoodblockResult:
    tree: QdTree
    best_fraction: float  # sample access fraction of the deployed tree
    history: list  # (episode, this_episode_fraction, best_so_far)


def _episode(
    trainer: PPOTrainer,
    feat: Featurizer,
    cm: CutMatrix,
    schema: TableSchema,
    workload: Sequence[QueryNode],
    query_refs: list,
    n_rows: int,
    b_sample: int,
    max_leaves: int,
    ac_names: tuple[str, ...],
    deterministic: bool = False,
):
    """Build one tree from the current policy (sampled, or argmax when
    ``deterministic``); returns (root, transitions, rewards, access_fraction)."""
    root = TreeNode(Description.root(schema, ac_names))
    root_idx = np.arange(n_rows)
    root_active = [
        qi for qi in range(len(workload)) if root.desc.may_intersect(workload[qi])
    ]
    queue: list[tuple[TreeNode, np.ndarray, list[int]]] = [
        (root, root_idx, root_active)
    ]
    transitions = []  # (obs, action, legal, logp, value, node)
    leaves = []  # (node, n_records, n_active)
    n_leaves_final = 0
    while queue:
        node, idx, active = queue.pop(0)
        node.n_rows = len(idx)
        legal = np.zeros(len(cm.cuts), dtype=bool)
        if n_leaves_final + len(queue) + 1 < max_leaves and len(idx) >= 2 * b_sample:
            counts = cm.left_counts(idx)
            legal = (counts >= b_sample) & (len(idx) - counts >= b_sample)
        if not legal.any():
            leaves.append((node, len(idx), len(active)))
            n_leaves_final += 1
            continue
        obs = feat(node.desc)
        if deterministic:
            logits, values, _ = trainer.net.forward(obs[None, :])
            masked = np.where(legal[None, :], logits, -np.inf)
            ci, logp, value = int(masked[0].argmax()), np.zeros(1), values
        else:
            a, logp, value = trainer.action_logp(obs[None, :], legal[None, :])
            ci = int(a[0])
        left, right = node.split(cm.cuts[ci])
        m = cm.masks[ci, idx]
        key = _cut_key(cm.cuts[ci])
        a_l, a_r = [], []
        for qi in active:
            if key in query_refs[qi]:
                if left.desc.may_intersect(workload[qi]):
                    a_l.append(qi)
                if right.desc.may_intersect(workload[qi]):
                    a_r.append(qi)
            else:
                a_l.append(qi)
                a_r.append(qi)
        queue.append((left, idx[m], a_l))
        queue.append((right, idx[~m], a_r))
        transitions.append((obs, ci, legal, float(logp[0]), float(value[0]), node))

    w = len(workload)
    accessed = sum(nrec * nact for _, nrec, nact in leaves)
    fraction = accessed / (n_rows * w) if w else 0.0

    # S(n): skipped records below each node (Sec 5.2.2), bottom-up
    skipped: dict[int, int] = {}
    for node, nrec, nact in leaves:
        skipped[id(node)] = nrec * (w - nact)

    def s_of(node: TreeNode) -> int:
        if id(node) in skipped:
            return skipped[id(node)]
        s = s_of(node.left) + s_of(node.right)
        skipped[id(node)] = s
        return s

    rewards = [
        s_of(node) / (w * node.n_rows) if w and node.n_rows else 0.0
        for *_, node in transitions
    ]
    return root, transitions, rewards, fraction


def woodblock_qdtree(
    encoded_sample: pd.DataFrame,
    schema: TableSchema,
    cuts: Sequence,
    workload: Sequence[QueryNode],
    b_sample: int,
    ac_names: tuple[str, ...] = (),
    config: WoodblockConfig | None = None,
) -> WoodblockResult:
    """Train WOODBLOCK on a data sample and return the best tree found.

    ``encoded_sample`` is the fixed construction sample (paper: s=0.1–1% of
    the data); ``b_sample`` is the min-block-size constraint scaled to the
    sample (``s·b``).
    """
    cfg = config or WoodblockConfig()
    cm = CutMatrix.build(cuts, encoded_sample)
    feat = Featurizer(schema, tuple(ac_names))
    net = PolicyValueNet(feat.dim, len(cm.cuts), hidden=cfg.hidden, seed=cfg.seed)
    trainer = PPOTrainer(
        net,
        lr=cfg.lr,
        clip=cfg.clip,
        vf_coef=cfg.vf_coef,
        ent_coef=cfg.ent_coef,
        epochs=cfg.epochs,
        minibatch=cfg.minibatch,
        seed=cfg.seed,
    )
    query_refs = [referenced_columns(q) for q in workload]
    n = len(encoded_sample)

    best_root, best_frac = None, np.inf
    history = []
    pend: list[tuple] = []  # accumulated transitions across batch_episodes
    for ep in range(cfg.episodes):
        root, transitions, rewards, frac = _episode(
            trainer, feat, cm, schema, workload, query_refs,
            n, b_sample, cfg.max_leaves, tuple(ac_names),
        )
        if frac < best_frac:
            best_frac, best_root = frac, root
        history.append((ep, frac, best_frac))
        pend.extend(
            (obs, a, legal, logp, value, r)
            for (obs, a, legal, logp, value, _), r in zip(transitions, rewards)
        )
        if (ep + 1) % cfg.batch_episodes == 0 and pend:
            batch = Batch(
                obs=np.stack([t[0] for t in pend]),
                actions=np.array([t[1] for t in pend], dtype=np.int64),
                legal=np.stack([t[2] for t in pend]),
                old_logp=np.array([t[3] for t in pend]),
                returns=np.array([t[5] for t in pend]),
                advantages=np.array([t[5] - t[4] for t in pend]),
            )
            trainer.update(batch)
            pend = []

    if cfg.final_greedy_rollout and best_root is not None:
        # deterministic deployment rollout: the argmax-policy tree is a
        # strong candidate once the policy has concentrated
        root, _, _, frac = _episode(
            trainer, feat, cm, schema, workload, query_refs,
            n, b_sample, cfg.max_leaves, tuple(ac_names), deterministic=True,
        )
        if frac < best_frac:
            best_frac, best_root = frac, root
        history.append((cfg.episodes, frac, best_frac))

    assert best_root is not None, "no episodes ran"
    return WoodblockResult(
        tree=QdTree.build(best_root, schema), best_fraction=best_frac, history=history
    )
