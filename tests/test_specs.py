"""Dataset registry (Table 2 analogs): invariants and scaling."""
import pytest

from repro.vectors.specs import SMALL_DATASETS, SPECS, DatasetSpec, get_spec

ALL = sorted(SPECS)


def test_registry_has_ten_datasets():
    assert len(SPECS) == 10


def test_small_datasets_are_eight():
    assert len(SMALL_DATASETS) == 8
    assert set(SMALL_DATASETS) <= set(SPECS)


@pytest.mark.parametrize("name", ALL)
def test_paper_dims_preserved(name):
    # Dimensions must match paper Table 2 exactly.
    expected = {
        "star": 1024, "msong": 420, "sift1m": 128, "deep1m": 256,
        "word2vec": 300, "hand": 2709, "glove1.2m": 200,
        "glove2.2m": 300, "spacev1b": 100, "sift1b": 128,
    }
    assert get_spec(name).dim == expected[name]


@pytest.mark.parametrize("name", ALL)
def test_paper_sizes_preserved(name):
    expected = {
        "star": 823_600, "msong": 992_272, "sift1m": 1_000_000,
        "deep1m": 1_000_000, "word2vec": 1_000_000, "hand": 1_000_000,
        "glove1.2m": 1_193_514, "glove2.2m": 2_196_017,
        "spacev1b": 1_000_000_000, "sift1b": 1_000_000_000,
    }
    assert get_spec(name).paper_size == expected[name]


@pytest.mark.parametrize("name", ALL)
def test_n_base_scales_linearly(name):
    spec = get_spec(name)
    assert spec.n_base(1.0) == spec.paper_size
    assert spec.n_base(0.01) == max(64, int(spec.paper_size * 0.01))


@pytest.mark.parametrize("name", ALL)
def test_n_base_floor(name):
    assert get_spec(name).n_base(1e-12) == 64


@pytest.mark.parametrize("name", ALL)
def test_n_query_bounds(name):
    spec = get_spec(name)
    for sf in (1e-9, 0.001, 0.01, 0.1, 1.0):
        assert 16 <= spec.n_query(sf) <= 256


@pytest.mark.parametrize("name", ALL)
def test_decay_nonnegative(name):
    assert get_spec(name).decay >= 0


def test_timeseries_decay_steepest():
    # Time-series analogs concentrate energy early (paper Table 3: Star
    # and Hand prune earliest), text embeddings are near-isotropic.
    assert get_spec("star").decay > get_spec("sift1m").decay
    assert get_spec("hand").decay > get_spec("glove1.2m").decay
    assert get_spec("glove1.2m").decay < 0.2
    assert get_spec("glove2.2m").decay < 0.2


def test_get_spec_unknown_raises():
    with pytest.raises(KeyError, match="unknown dataset"):
        get_spec("nope")


def test_spec_is_frozen():
    with pytest.raises(Exception):
        get_spec("sift1m").dim = 1


def test_spec_defaults():
    s = DatasetSpec("t", 100, 8, 10, "Test", decay=0.5)
    assert s.n_centers == 48 and s.radial_sigma > 0
