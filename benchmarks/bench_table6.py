"""Benchmark for Table 6: the event-mining comparison harness."""


def test_bench_event_table(benchmark, spark, bench_examples):
    from repro.evalsets import event_examples
    from repro.experiments import run_event_table

    emd = event_examples(bench_examples)

    def run():
        return run_event_table(emd, bench_examples, spark=spark)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n[bench_table6]\n", table.to_string(index=False))
    t = table.set_index("Method")
    assert t.loc["GCTSP-Net"].EM == t.EM.max()
