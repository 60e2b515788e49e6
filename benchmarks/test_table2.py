"""Benchmark target regenerating Table 2 (data-induced column pruning)."""


def test_table2_data_induced(benchmark, capsys):
    from repro.experiments import table2

    with capsys.disabled():
        rows = benchmark.pedantic(
        lambda: table2.run(n_rows=40_000), rounds=1, iterations=1
    )
    by_depth = {r["depth"]: r for r in rows}
    # paper shape: partitioning prunes more columns than global stats, and
    # depth-10 models lose more columns than depth-20 ones under rcount
    for depth, r in by_depth.items():
        assert max(r["num_issues"], r["rcount"]) >= r["none"]
    assert by_depth[10]["rcount"] >= by_depth[20]["rcount"]
