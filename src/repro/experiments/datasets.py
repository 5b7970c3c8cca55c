"""The six interaction datasets (paper Table I), synthesized per DESIGN §2.

Each generator is deterministic in ``(name, n_steps, seed)``. Parameters
are chosen so the *relative* characters match the paper's datasets:
the LBSN pair is bipartite with strong place-popularity skew, the Twitter
pair is hub-dominated with retweet cascades, and the StackOverflow pair
has a flatter influence distribution over many more nodes.
"""
from __future__ import annotations

import pandas as pd

from repro.synth_data import lbsn_stream, qa_stream, retweet_stream

#: Dataset name -> generator(n_steps, seed) (paper Table I order).
_GENERATORS = {
    "brightkite": lambda n, s: lbsn_stream(
        n_steps=n, n_places=200, n_users=800, alpha=1.1, seed=s
    ),
    "gowalla": lambda n, s: lbsn_stream(
        n_steps=n, n_places=350, n_users=1400, alpha=1.0, seed=s + 1
    ),
    "twitter-higgs": lambda n, s: retweet_stream(
        n_steps=n, n_users=1500, alpha=1.3, chain_prob=0.3, seed=s + 2
    ),
    "twitter-hk": lambda n, s: retweet_stream(
        n_steps=n, n_users=800, alpha=1.1, chain_prob=0.2, seed=s + 3
    ),
    "stackoverflow-c2q": lambda n, s: qa_stream(
        n_steps=n, n_users=2000, alpha=0.8, seed=s + 4
    ),
    "stackoverflow-c2a": lambda n, s: qa_stream(
        n_steps=n, n_users=2500, alpha=0.7, seed=s + 5
    ),
}

DATASET_NAMES = tuple(_GENERATORS)


def make_stream(name: str, n_steps: int, seed: int = 0) -> pd.DataFrame:
    """Interaction stream ``(u, v, t)`` for a named dataset."""
    try:
        gen = _GENERATORS[name]
    except KeyError:
        raise ValueError(f"unknown dataset {name!r}; pick from {DATASET_NAMES}")
    return gen(n_steps, seed)


def summary_table(n_steps: int, seed: int = 0) -> pd.DataFrame:
    """Table-I analog: #nodes and #interactions per dataset."""
    rows = []
    for name in DATASET_NAMES:
        pdf = make_stream(name, n_steps, seed)
        rows.append(
            {
                "dataset": name,
                "n_nodes": int(pd.concat([pdf["u"], pdf["v"]]).nunique()),
                "n_interactions": len(pdf),
            }
        )
    return pd.DataFrame(rows)
