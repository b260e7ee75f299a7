"""Benchmark for Table 2: full ontology construction (mining + all edge
linking) and its accuracy against gold."""


def test_bench_build_ontology(
    benchmark, spark, bench_world, bench_frames, bench_phrase_model, bench_element_model
):
    from repro.core.ontology import build_ontology, evaluate_ontology

    def run():
        ao = build_ontology(
            spark,
            bench_frames,
            list(bench_world.ontology.entities.phrase),
            list(bench_world.ontology.categories.name),
            bench_phrase_model,
            bench_element_model,
        )
        return ao

    ao = benchmark.pedantic(run, rounds=1, iterations=1)
    acc = evaluate_ontology(ao, bench_world).set_index("type")
    print("\n[bench_table2] edge counts/accuracy:\n", acc)
    assert acc.loc["isA"].accuracy > 0.8
