"""E4 (Figure 7, §6.4): runtime overhead of error-estimation methods on
flat / join / nested queries.

Paper reference: variational subsampling added only 0.38-0.87 s to the
query latencies while consolidated bootstrap and traditional
subsampling added orders of magnitude more (189x/237x/100x vs
bootstrap; 348x vs traditional overall) — their constructions are
O(b*n) versus O(n).
"""
from repro.experiments.error_estimation import run_error_estimation
from repro.experiments.report import emit


def test_error_estimation_overhead(benchmark, spark, tpch_bench):
    def run():
        return run_error_estimation(
            spark, sample_ratio=1.0, hash_ratio=0.5, b=200, seed=505
        )

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    emit(
        "e4_error_estimation",
        "E4: error-estimation overhead, b=200 (Fig 7)",
        rows,
    )
    for shape in ("flat", "join", "nested"):
        sub = {
            r["method"]: r for r in rows
            if r["shape"] == shape and not r["method"].startswith("ratio")
        }
        # shape: the O(b*n) methods cost more total time than the O(n)
        # variational rewrite on every query shape
        assert sub["traditional"]["total_s"] > sub["variational"]["total_s"]
        assert sub["bootstrap"]["total_s"] > sub["variational"]["total_s"]
