"""Cross-format contract tests: every registry format is lossless,
serializable, and op-correct against numpy ground truth."""
import numpy as np
import pytest

from repro.formats import REGISTRY, get_format
from repro.formats.base import check_batch_interface
from repro.formats.dense import den_size_bytes

FORMATS = sorted(REGISTRY)

MATRICES = {
    "sparse_redundant": np.random.default_rng(0).choice(
        [0.0, 0.0, 1.5, 2.5], size=(30, 12)
    ),
    "dense_random": np.random.default_rng(1).random((12, 8)),
    "with_zero_rows": np.vstack([np.zeros((2, 6)), np.ones((3, 6)) * 2.5]),
    "all_zero": np.zeros((5, 4)),
}


@pytest.fixture(params=FORMATS)
def fmt(request):
    return get_format(request.param)


@pytest.fixture(params=sorted(MATRICES))
def X(request):
    return MATRICES[request.param]


class TestInterface:
    def test_registry_names_match_class_names(self):
        for name, cls in REGISTRY.items():
            assert cls.name == name

    def test_interface_complete(self, fmt):
        batch = fmt.encode(MATRICES["sparse_redundant"])
        assert check_batch_interface(batch) == []

    def test_unknown_format_raises(self):
        with pytest.raises(KeyError):
            get_format("LZ4")

    def test_registry_has_all_paper_methods(self):
        assert set(REGISTRY) == {"TOC", "DEN", "CSR", "CVI", "DVI", "CLA", "Snappy", "Gzip"}


class TestLossless:
    def test_decode_roundtrip(self, fmt, X):
        np.testing.assert_array_equal(fmt.encode(X).decode(), X)

    def test_bytes_roundtrip(self, fmt, X):
        batch = fmt.encode(X)
        again = fmt.from_bytes(batch.to_bytes())
        np.testing.assert_array_equal(again.decode(), X)
        assert tuple(again.shape) == tuple(X.shape)

    def test_wrong_magic_rejected(self, fmt):
        with pytest.raises(ValueError):
            fmt.from_bytes(b"XXXX" + b"\x00" * 64)


class TestOps:
    def test_dot_vec(self, fmt, X):
        v = np.random.default_rng(2).random(X.shape[1])
        np.testing.assert_allclose(fmt.encode(X).dot_vec(v), X @ v, atol=1e-10)

    def test_vec_dot(self, fmt, X):
        u = np.random.default_rng(3).random(X.shape[0])
        np.testing.assert_allclose(fmt.encode(X).vec_dot(u), u @ X, atol=1e-10)

    def test_dot_mat(self, fmt, X):
        M = np.random.default_rng(4).random((X.shape[1], 5))
        np.testing.assert_allclose(fmt.encode(X).dot_mat(M), X @ M, atol=1e-10)

    def test_mat_dot(self, fmt, X):
        P = np.random.default_rng(5).random((4, X.shape[0]))
        np.testing.assert_allclose(fmt.encode(X).mat_dot(P), P @ X, atol=1e-10)

    def test_scal(self, fmt, X):
        np.testing.assert_allclose(fmt.encode(X).scal(-1.5).decode(), X * -1.5, atol=1e-10)

    def test_add_scalar(self, fmt, X):
        np.testing.assert_allclose(fmt.encode(X).add_scalar(2.5), X + 2.5, atol=1e-10)

    def test_scal_does_not_mutate_original(self, fmt, X):
        batch = fmt.encode(X)
        batch.scal(7.0)
        np.testing.assert_array_equal(batch.decode(), X)


class TestSizes:
    def test_den_is_the_reference_size(self):
        X = MATRICES["sparse_redundant"]
        assert REGISTRY["DEN"].encode(X).size_bytes() == den_size_bytes(*X.shape)

    @pytest.mark.parametrize("name", ["TOC", "DEN", "CSR", "CVI", "DVI", "Snappy", "Gzip"])
    def test_size_bytes_equals_blob_length(self, name):
        batch = REGISTRY[name].encode(MATRICES["sparse_redundant"])
        assert batch.size_bytes() == len(batch.to_bytes())

    def test_cla_logical_size_not_above_blob(self):
        # CLA reports the logical compressed size; the pickle container
        # is allowed to be larger (documented).
        batch = REGISTRY["CLA"].encode(MATRICES["sparse_redundant"])
        assert batch.size_bytes() <= len(batch.to_bytes())

    def test_toc_beats_lightweight_formats_on_redundant_data(self):
        # The paper's Figure-1C claim, at unit-test scale: on redundant
        # sparse data TOC < CVI < CSR < DEN.
        X = np.tile(
            np.random.default_rng(6).choice([0.0, 0.0, 1.5, 2.5], size=20), (60, 1)
        )
        sizes = {n: REGISTRY[n].encode(X).size_bytes() for n in ("TOC", "CVI", "CSR", "DEN")}
        assert sizes["TOC"] < sizes["CVI"] < sizes["CSR"] < sizes["DEN"]

    def test_snappy_faster_worse_ratio_than_gzip(self):
        X = np.random.default_rng(7).choice([0.0, 0.0, 1.5, 2.5], size=(200, 40))
        assert (
            REGISTRY["Gzip"].encode(X).size_bytes()
            <= REGISTRY["Snappy"].encode(X).size_bytes()
        )


class TestCodecStepCache:
    def test_begin_end_step_cycle(self):
        X = MATRICES["sparse_redundant"]
        batch = REGISTRY["Gzip"].encode(X)
        batch.begin_step()
        assert batch._step_cache is not None
        np.testing.assert_array_equal(batch.decode(), X)
        batch.end_step()
        assert batch._step_cache is None

    def test_ops_work_without_step_cache(self):
        X = MATRICES["sparse_redundant"]
        batch = REGISTRY["Snappy"].encode(X)
        v = np.arange(X.shape[1], dtype=np.float64)
        np.testing.assert_allclose(batch.dot_vec(v), X @ v)
