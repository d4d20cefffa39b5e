"""Microbenchmarks of the CLIMBER-FX kernels (PAA, P⁴ signatures, metrics).

These are the per-record costs that Fig. 10(a) attributes the build-time
growth to ("pivot-based conversions and comparisons"); measured here as
pure numpy kernels over a 10k×256 batch.
"""
import numpy as np
import pytest

from repro.core.distances import centroid_mask, decay_weights, ed_np, od_matrix, wd_matrix
from repro.core.paa import paa_np, znorm_np
from repro.core.pivots import signatures_np

B, N, W, R, M = 10_000, 256, 16, 64, 6


@pytest.fixture(scope="module")
def batch():
    rng = np.random.default_rng(0)
    X = np.cumsum(rng.normal(size=(B, N)), axis=1)
    paa = paa_np(znorm_np(X), W)
    pivots = paa[rng.choice(B, R, replace=False)]
    sigs, _ = signatures_np(paa, pivots, M)
    cents = [tuple(sorted(rng.choice(R, M, replace=False))) for _ in range(16)]
    return X, paa, pivots, sigs, centroid_mask(cents, R)


def test_paa_kernel(benchmark, batch):
    X, *_ = batch
    benchmark(paa_np, X, W)


def test_znorm_kernel(benchmark, batch):
    X, *_ = batch
    benchmark(znorm_np, X)


def test_signature_kernel(benchmark, batch):
    _, paa, pivots, _, _ = batch
    benchmark(signatures_np, paa, pivots, M)


@pytest.mark.parametrize("r", [32, 64, 128, 256])
def test_signature_kernel_vs_pivot_count(benchmark, batch, r):
    """Fig. 10(a): conversion cost grows with the number of pivots."""
    _, paa, _, _, _ = batch
    rng = np.random.default_rng(r)
    pivots = paa[rng.choice(B, r, replace=False)]
    benchmark(signatures_np, paa, pivots, M)


def test_od_matrix_kernel(benchmark, batch):
    *_, sigs, mask = batch
    benchmark(od_matrix, sigs, mask)


def test_wd_matrix_kernel(benchmark, batch):
    *_, sigs, mask = batch
    w = decay_weights(M, "exp", 0.5)
    benchmark(wd_matrix, sigs, mask, w)


def test_ed_refinement_kernel(benchmark, batch):
    X, *_ = batch
    Q = X[:8]
    benchmark(ed_np, X, Q)
