"""Benchmark target regenerating Table 1 (dataset statistics)."""


def test_table1_datasets(benchmark, capsys):
    from repro.experiments import table1

    with capsys.disabled():
        rows = benchmark.pedantic(lambda: table1.run(n_rows=3000), rounds=1, iterations=1)
    assert len(rows) == 4
    for r in rows:
        paper = r["paper"]
        assert (r["tables"], r["inputs"]) == (paper[0], paper[1])
        assert (r["features_num"], r["features_cat"]) == (paper[4], paper[5])
