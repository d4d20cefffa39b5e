"""Table I miniature — CLIMBER vs Odyssey vs ParlayANN-HNSW on one size.

Paper shape to check in the timings + extra_info:
* I.C.T: ParlayANN ≫ CLIMBER > Odyssey
* Q.R.T: CLIMBER ≫ Odyssey > ParlayANN
* R.R: Odyssey = 1.0, ParlayANN ≈ 0.9+, CLIMBER in the 0.6–0.8 band.
The size sweep with the capacity-failure X cells is produced by
``jobs/table1_memory_systems.py``.
"""
from repro.harness.recall import recall_batch
from repro.memsys.odyssey import OdysseyEngine
from repro.memsys.parlayann import ParlayAnnHnsw

from .conftest import K_BENCH, once


def test_ict_odyssey(benchmark, bench_matrix):
    ids, X = bench_matrix

    def build():
        eng = OdysseyEngine(w=16)
        eng.build(X, ids)
        return eng

    once(benchmark, build)


def test_ict_parlayann(benchmark, bench_matrix):
    ids, X = bench_matrix

    def build():
        eng = ParlayAnnHnsw(M=8, ef_construction=48, seed=0)
        eng.build(X, ids)
        return eng

    once(benchmark, build)


def test_qrt_odyssey(benchmark, bench_matrix, bench_queries, bench_gt):
    ids, X = bench_matrix
    eng = OdysseyEngine(w=16)
    eng.build(X, ids)
    res = once(benchmark, eng.knn_batch, bench_queries, K_BENCH)
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)  # must be 1.0


def test_qrt_parlayann(benchmark, bench_matrix, bench_queries, bench_gt):
    ids, X = bench_matrix
    eng = ParlayAnnHnsw(M=8, ef_construction=48, ef_search=96, seed=0)
    eng.build(X, ids)
    res = once(benchmark, eng.knn_batch, bench_queries, K_BENCH)
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)


def test_qrt_climber(benchmark, spark, bench_climber, bench_queries, bench_gt):
    res, _ = once(benchmark, bench_climber.knn_batch, spark, bench_queries,
                  K_BENCH, variant="adaptive-4x")
    benchmark.extra_info["recall"] = recall_batch(res, bench_gt)
