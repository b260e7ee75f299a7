"""Benchmark for Table 1: attention-node mining over the click graph
(clustering + distributed GCTSP-Net + normalization)."""


def test_bench_mine_attention_nodes(
    benchmark, spark, bench_frames, bench_phrase_model
):
    from repro.core.ontology import mine_attention_nodes

    def run():
        nodes, _ = mine_attention_nodes(spark, bench_frames, bench_phrase_model)
        return len(nodes)

    n = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n > 50
