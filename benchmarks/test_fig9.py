"""Benchmark target regenerating Fig 9 (LR sparsity micro-experiment)."""


def test_fig9_lr_sparsity(benchmark, spark, capsys):
    from repro.experiments import fig9

    with capsys.disabled():
        rows = benchmark.pedantic(
        lambda: fig9.run(spark, n_rows=150_000, runs=3), rounds=1, iterations=1
    )
    # paper shape: zero-weights decrease as alpha grows; the combined rule
    # is best (or ties) at the sparsest setting
    zeros = [r["zero_weights"] for r in rows]
    assert zeros[0] >= zeros[-1]
    assert zeros[0] >= 14  # strong regularization: most of 28 inputs unused
    sparsest = rows[0]
    assert sparsest["modelproj+mltosql"] <= sparsest["noopt"] * 1.05
