"""Benchmark target regenerating Fig 6 (end-to-end Spark comparison)."""
import os

SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.5"))


def test_fig6_end_to_end(benchmark, spark, capsys):
    from repro.experiments import fig6

    with capsys.disabled():
        rows = benchmark.pedantic(
        lambda: fig6.run(spark, scale=SCALE, runs=3), rounds=1, iterations=1
    )
    # paper shape: Raven never slower than no-opt by more than noise, and
    # at least one LR/DT query gets a clear (>1.3x) win
    assert all(r["speedup_vs_noopt"] > 0.6 for r in rows)
    assert max(
        r["speedup_vs_noopt"] for r in rows if r["model"] in ("lr", "dt")
    ) > 1.3
