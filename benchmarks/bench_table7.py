"""Benchmark for Table 7: the key-element recognition harness."""


def test_bench_elements_table(benchmark, bench_examples):
    from repro.evalsets import event_examples
    from repro.experiments import run_elements_table

    emd = event_examples(bench_examples)

    def run():
        return run_elements_table(emd)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n[bench_table7]\n", table.to_string(index=False))
    t = table.set_index("Method")
    assert t.loc["GCTSP-Net"]["F1-micro"] == t["F1-micro"].max()
