"""Tests for the pure LIRE math (paper §3.3).

The key property: conditions 1 and 2 are *necessary* — any vector whose
true nearest centroid actually changed relative to a nearby posting must
satisfy the applicable condition. We verify this with randomized
geometric scenarios (hypothesis) by constructing splits and checking that
no NPA violation escapes the condition filter.
"""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.clustering import balanced_two_means
from repro.core.distances import pairwise_sq_l2
from repro.core.lire import (
    condition_one,
    condition_two,
    npa_violated,
    reassign_candidate_mask,
)


def figure4_scenario():
    """The paper's Figure 4 geometry in 2-D.

    Posting A at origin splits into A1 (left) and A2 (right); posting B
    sits to the right. The 'yellow dot' was in A, lands in A2, but B is
    now its true nearest. The 'green dot' is in B but A2's new centroid
    is closer than B's.
    """
    a_old = np.array([0.0, 0.0])
    a1 = np.array([-1.5, 0.0])
    a2 = np.array([1.5, 0.0])
    b = np.array([0.0, 2.5])
    # yellow: was in A (d_old=1.44 <= d_B=1.69); after the split both new
    # centroids are farther (3.69) so B becomes its true nearest.
    yellow = np.array([0.0, 1.2])
    # green: was in B (d_B=3.40 <= d_old=3.65); after the split A2 is
    # closer (1.70) than B.
    green = np.array([1.4, 1.3])
    return a_old, np.stack([a1, a2]), b, yellow, green


class TestFigure4:
    def test_yellow_dot_flagged_by_condition_one(self):
        a_old, new, b, yellow, _ = figure4_scenario()
        # sanity: B is truly nearest for the yellow dot after the split
        d = pairwise_sq_l2(yellow[None, :], np.vstack([new, b[None, :]]))[0]
        assert d.argmin() == 2
        assert condition_one(yellow[None, :], a_old, new)[0]

    def test_green_dot_flagged_by_condition_two(self):
        a_old, new, b, _, green = figure4_scenario()
        d = pairwise_sq_l2(green[None, :], np.vstack([new, b[None, :]]))[0]
        assert d.argmin() == 1  # A2 beats B now
        assert condition_two(green[None, :], a_old, new)[0]

    def test_interior_vector_not_flagged(self):
        a_old, new, b, _, _ = figure4_scenario()
        # a vector right next to A1's new centroid: clearly fine, cond 1 false
        v = np.array([[-1.5, 0.05]])
        assert not condition_one(v, a_old, new)[0]

    def test_far_vector_in_b_not_flagged(self):
        a_old, new, b, _, _ = figure4_scenario()
        v = np.array([[0.0, 4.0]])  # deep inside B's territory
        assert not condition_two(v, a_old, new)[0]


class TestConditionSemantics:
    def test_condition_one_requires_all_new_farther(self):
        a_old = np.zeros(2)
        new = np.array([[0.1, 0.0], [5.0, 0.0]])
        v = np.array([[0.08, 0.0]])  # closer to new[0] than to a_old
        assert not condition_one(v, a_old, new)[0]

    def test_condition_two_requires_any_new_closer(self):
        a_old = np.zeros(2)
        new = np.array([[3.0, 0.0], [0.0, 3.0]])
        v = np.array([[2.0, 0.0]])  # new[0] at d=1 beats a_old at d=4
        assert condition_two(v, a_old, new)[0]
        far = np.array([[-5.0, 0.0]])  # both new centroids worse than a_old
        assert not condition_two(far, a_old, new)[0]

    def test_dispatch(self):
        a_old, new, _, yellow, green = figure4_scenario()
        m1 = reassign_candidate_mask(yellow[None, :], a_old, new, in_split_posting=True)
        m2 = reassign_candidate_mask(green[None, :], a_old, new, in_split_posting=False)
        assert m1[0] and m2[0]

    def test_boundary_equality_is_included(self):
        # D(v, A_o) == D(v, A_i): conditions use <=, so v must be flagged
        a_old = np.array([0.0, 0.0])
        new = np.array([[2.0, 0.0], [0.0, 2.0]])
        v = np.array([[1.0, 0.0]])  # equidistant to a_old and new[0]
        assert condition_two(v, a_old, new)[0]


@st.composite
def split_scenario(draw):
    """Random posting + neighbor geometry for the necessity property."""
    rng = np.random.default_rng(draw(st.integers(0, 10_000)))
    dim = draw(st.sampled_from([2, 3, 8]))
    n = draw(st.integers(10, 60))
    pts = rng.normal(0, 1, (n, dim)) * 10
    nbr_centroid = rng.normal(0, 1, dim) * 10 + 5
    return pts, nbr_centroid


class TestNecessityProperty:
    @given(split_scenario())
    @settings(max_examples=60, deadline=None)
    def test_condition_one_is_necessary(self, scenario):
        """Any split-posting vector whose true nearest moved to the
        neighbor centroid must pass condition 1."""
        pts, b = scenario
        a_old = pts.mean(axis=0)
        new_centroids, labels = balanced_two_means(pts, seed=0)
        for i, v in enumerate(pts):
            own_new = new_centroids[labels[i]]
            d_b = pairwise_sq_l2(v[None, :], b[None, :])[0, 0]
            d_own = pairwise_sq_l2(v[None, :], own_new[None, :])[0, 0]
            d_other = pairwise_sq_l2(v[None, :], new_centroids)[0].min()
            npa_broken = d_b < min(d_own, d_other)
            # NPA precondition of the proof: v belonged to A, so
            # D(v, A_o) <= D(v, B) held before the split.
            d_old = pairwise_sq_l2(v[None, :], a_old[None, :])[0, 0]
            if npa_broken and d_old <= d_b:
                assert condition_one(v[None, :], a_old, new_centroids)[0]

    @given(split_scenario())
    @settings(max_examples=60, deadline=None)
    def test_condition_two_is_necessary(self, scenario):
        """Any neighbor-posting vector whose true nearest became one of
        the new centroids must pass condition 2."""
        pts, b = scenario
        a_old = pts.mean(axis=0)
        new_centroids, _ = balanced_two_means(pts, seed=0)
        rng = np.random.default_rng(1)
        nbr_pts = b + rng.normal(0, 3, (30, len(b)))
        d_new = pairwise_sq_l2(nbr_pts, new_centroids).min(axis=1)
        d_b = pairwise_sq_l2(nbr_pts, b[None, :])[:, 0]
        d_old = pairwise_sq_l2(nbr_pts, a_old[None, :])[:, 0]
        moved = d_new < d_b
        # NPA precondition: these vectors belonged to B, so D(v,B) <= D(v,A_o)
        applicable = moved & (d_b <= d_old)
        flagged = condition_two(nbr_pts, a_old, new_centroids)
        assert (flagged | ~applicable).all()


class TestNPAViolated:
    def test_detects_violation(self):
        vecs = np.array([[0.0, 0.0], [10.0, 0.0]])
        own = np.array([[5.0, 0.0], [5.0, 0.0]])
        all_c = np.array([[5.0, 0.0], [0.5, 0.0]])
        v = npa_violated(vecs, own, all_c)
        assert v[0] and not v[1]

    def test_shape_mismatch_raises(self):
        with pytest.raises(ValueError):
            npa_violated(np.zeros((2, 2)), np.zeros((3, 2)), np.zeros((1, 2)))
