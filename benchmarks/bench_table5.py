"""Benchmark for Table 5: the concept-mining comparison harness
(all eight methods trained + evaluated)."""


def test_bench_concept_table(benchmark, spark, bench_world, bench_examples):
    from repro.evalsets import concept_examples
    from repro.experiments import corpus_inputs, run_concept_table

    texts, queries = corpus_inputs(bench_world)
    cmd = concept_examples(bench_examples)

    def run():
        return run_concept_table(cmd, bench_examples, texts, queries, spark=spark)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n[bench_table5]\n", table.to_string(index=False))
    best = table.set_index("Method").F1.idxmax()
    assert best == "GCTSP-Net"
