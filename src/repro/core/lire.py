"""Pure LIRE math: the two necessary reassignment conditions (paper §3.3).

After a split replaces old centroid ``A_o`` with new centroids
``A_1, A_2`` (and, for a merge, simply deletes a centroid), the Nearest
Partition Assignment (NPA) invariant — every vector lives in the posting
of its nearest centroid — may be violated for vectors in the split
posting and its neighborhood. LIRE narrows the candidate set with two
*necessary* conditions:

- **Condition 1** (vectors that were in the split posting): a vector
  ``v`` need only be checked if ``D(v, A_o) <= D(v, A_i)`` for *all* new
  centroids ``A_i`` — i.e. the deleted centroid was still its best among
  the changed ones, so some unexamined neighbor centroid (``B``) might
  now be the true nearest.
- **Condition 2** (vectors in a nearby posting ``B``): a vector need
  only be checked if ``D(v, A_i) <= D(v, A_o)`` for *some* new centroid —
  i.e. a new centroid moved closer than the deleted one, so it might
  beat ``B``.

These are pure numpy predicates so they can be property-tested for the
"necessary" claim and reused verbatim by the Spark implementation's
pandas UDFs.
"""
from __future__ import annotations

import numpy as np

from repro.core.distances import pairwise_sq_l2


def condition_one(vecs: np.ndarray, old_centroid: np.ndarray, new_centroids: np.ndarray) -> np.ndarray:
    """Mask of split-posting vectors that must be *checked* for reassignment.

    True iff ``D(v, A_o) <= D(v, A_i)`` for every new centroid ``A_i``.
    """
    vecs = np.atleast_2d(vecs)
    d_old = pairwise_sq_l2(vecs, np.atleast_2d(old_centroid))[:, 0]
    d_new = pairwise_sq_l2(vecs, np.atleast_2d(new_centroids))
    return (d_old[:, None] <= d_new).all(axis=1)


def condition_two(vecs: np.ndarray, old_centroid: np.ndarray, new_centroids: np.ndarray) -> np.ndarray:
    """Mask of neighbor-posting vectors that must be *checked*.

    True iff ``D(v, A_i) <= D(v, A_o)`` for some new centroid ``A_i``.
    """
    vecs = np.atleast_2d(vecs)
    d_old = pairwise_sq_l2(vecs, np.atleast_2d(old_centroid))[:, 0]
    d_new = pairwise_sq_l2(vecs, np.atleast_2d(new_centroids))
    return (d_new <= d_old[:, None]).any(axis=1)


def npa_violated(
    vecs: np.ndarray, own_centroids: np.ndarray, all_centroids: np.ndarray
) -> np.ndarray:
    """Mask of vectors whose current posting centroid is no longer nearest.

    ``own_centroids`` is the (n, d) matrix of each vector's current
    centroid; ``all_centroids`` the (k, d) matrix of every alive centroid.
    Used as the final NPA check that weeds out false positives from the
    two necessary conditions before an actual reassign is executed.
    """
    d_own = pairwise_sq_l2(vecs, own_centroids).diagonal() if vecs.shape == own_centroids.shape else None
    if d_own is None:
        raise ValueError("own_centroids must align row-wise with vecs")
    d_all = pairwise_sq_l2(vecs, all_centroids)
    return d_all.min(axis=1) < d_own - 1e-9


def reassign_candidate_mask(
    vecs: np.ndarray,
    old_centroid: np.ndarray,
    new_centroids: np.ndarray,
    *,
    in_split_posting: bool,
) -> np.ndarray:
    """Dispatch to the right necessary condition for a batch of vectors."""
    if in_split_posting:
        return condition_one(vecs, old_centroid, new_centroids)
    return condition_two(vecs, old_centroid, new_centroids)
