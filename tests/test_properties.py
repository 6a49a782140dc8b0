"""Property-based tests (hypothesis) for the pruning/partition math."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.partition import pack_clusters, split_dims
from repro.core.pruning import TopK
from repro.ivf.kmeans import pairwise_sq_l2

FLOATS = st.floats(-100, 100, allow_nan=False, width=32)


@given(st.integers(1, 512), st.integers(1, 16))
def test_split_dims_partitions_range(dim, bd):
    bd = min(bd, dim)
    bounds = split_dims(dim, bd)
    covered = []
    for lo, hi in bounds:
        covered.extend(range(lo, hi))
    assert covered == list(range(dim))


@given(
    st.lists(st.floats(0, 1000, allow_nan=False), min_size=1, max_size=40),
    st.integers(1, 6),
)
def test_pack_clusters_lpt_bound(weights, b_vec):
    # LPT guarantee: max load <= ideal + max single weight.
    w = np.asarray(weights)
    a = pack_clusters(w, b_vec)
    loads = np.zeros(b_vec)
    for c, v in enumerate(a):
        loads[v] += w[c]
    assert loads.max() <= w.sum() / b_vec + w.max() + 1e-9


@given(
    st.lists(st.lists(FLOATS, min_size=4, max_size=4), min_size=2,
             max_size=30),
    st.integers(1, 4),
)
@settings(max_examples=40)
def test_partial_sums_monotone(rows, b_dim):
    # Monotonicity (§3.1): cumulative partial squared-L2 sums never
    # decrease as more dimension blocks are added.
    x = np.asarray(rows, dtype=np.float32)
    q = x[0]
    bounds = split_dims(x.shape[1], min(b_dim, x.shape[1]))
    s = np.zeros(len(x))
    prev = s.copy()
    for lo, hi in bounds:
        s = s + ((x[:, lo:hi] - q[lo:hi]) ** 2).sum(1)
        assert np.all(s >= prev - 1e-6)
        prev = s.copy()
    full = ((x - q) ** 2).sum(1)
    np.testing.assert_allclose(s, full, rtol=1e-3, atol=1e-3)


@given(
    st.lists(st.floats(0, 1e6, allow_nan=False), min_size=1, max_size=60),
    st.integers(1, 10),
)
@settings(max_examples=40)
def test_topk_matches_sorted_reference(dists, k):
    t = TopK(1, k)
    t.update(0, np.arange(len(dists)), np.asarray(dists))
    _, got = t.result()
    want = np.sort(np.asarray(dists))[:k]
    got = got[0][: len(want)]
    np.testing.assert_allclose(got[np.isfinite(got)],
                               want[: np.isfinite(got).sum()])


@given(
    st.lists(st.floats(0, 1e6, allow_nan=False), min_size=1, max_size=50),
    st.integers(1, 8),
)
@settings(max_examples=40)
def test_topk_threshold_upper_bounds_members(dists, k):
    t = TopK(1, k)
    t.update(0, np.arange(len(dists)), np.asarray(dists))
    _, res = t.result()
    th = t.threshold(0)
    finite = res[0][np.isfinite(res[0])]
    assert np.all(finite <= th + 1e-9)


@given(
    st.lists(st.lists(FLOATS, min_size=3, max_size=3), min_size=1,
             max_size=20),
)
@settings(max_examples=40)
def test_pairwise_sq_l2_symmetric_psd(rows):
    a = np.asarray(rows, dtype=np.float32)
    d = pairwise_sq_l2(a, a)
    assert d.min() >= 0
    np.testing.assert_allclose(d, d.T, rtol=1e-3, atol=1e-2)
