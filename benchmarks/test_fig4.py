"""Benchmark target regenerating Fig 4 (strategy evaluation)."""


def test_fig4_strategies(benchmark, capsys):
    from repro.experiments import fig4

    with capsys.disabled():
        rows = benchmark.pedantic(
        lambda: fig4.run(n_pipelines=120, n_repeats=10), rounds=1, iterations=1
    )
    by = {r["strategy"]: r for r in rows}
    for r in by.values():
        assert r["accuracy"] > 0.5  # all beat random over 3 classes
        assert r["speedup_median"] > 0.5
