"""k-means++ seeding (Arthur & Vassilvitskii 2007).

BADGE (§2.3.4) selects the batch by running k-means++ *seeding* on the
hallucinated gradient embeddings — the seeds themselves are the chosen
examples, so only the seeding step is needed.
"""
from __future__ import annotations

import numpy as np


def kmeans_pp_indices(X: np.ndarray, k: int, rng: np.random.Generator) -> np.ndarray:
    """Indices of k seeds chosen with D^2 weighting (deterministic in rng)."""
    n = X.shape[0]
    k = min(k, n)
    if k == 0:
        return np.array([], dtype=int)
    chosen = [int(rng.integers(n))]
    d2 = ((X - X[chosen[0]]) ** 2).sum(axis=1)
    for _ in range(1, k):
        total = d2.sum()
        if total <= 0:
            # all remaining points coincide with a seed: fill uniformly
            rest = np.setdiff1d(np.arange(n), np.array(chosen))
            fill = rng.permutation(rest)[: k - len(chosen)]
            chosen.extend(int(i) for i in fill)
            break
        probs = d2 / total
        nxt = int(rng.choice(n, p=probs))
        chosen.append(nxt)
        d2 = np.minimum(d2, ((X - X[nxt]) ** 2).sum(axis=1))
    return np.array(chosen, dtype=int)
