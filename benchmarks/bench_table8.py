"""Benchmark for §5.4: document tagging + the CTR simulation."""


def test_bench_tagging_and_ctr(
    benchmark, spark, bench_world, bench_frames, bench_phrase_model, bench_element_model
):
    from repro.core import linking, tagging
    from repro.core.ontology import build_ontology, mine_attention_nodes
    from repro.recsim.recommend import assemble_doc_tags, run_simulation

    ao = build_ontology(
        spark,
        bench_frames,
        list(bench_world.ontology.entities.phrase),
        list(bench_world.ontology.categories.name),
        bench_phrase_model,
        bench_element_model,
    )
    nodes, merged = mine_attention_nodes(spark, bench_frames, bench_phrase_model)
    mentions = linking.entity_mentions(
        bench_frames["docs"], list(bench_world.ontology.entities.phrase)
    ).cache()
    ce = ao.edges[
        (ao.edges.type == "isA")
        & (ao.edges.src_kind == "concept")
        & (ao.edges.dst_kind == "entity")
    ].rename(columns={"src": "node_phrase", "dst": "entity_phrase"})
    reps = tagging.concept_context_reps(ao.members, merged[merged.kind == "concept"])

    def run():
        concept_tags = tagging.tag_concepts(
            bench_frames["docs"], mentions, ce, reps
        ).toPandas()
        ev_members = (
            merged[merged.kind == "event"]
            .groupby("node_phrase")
            .first()
            .reset_index()[["node_phrase", "titles"]]
        )
        matcher = tagging.build_event_matcher(ev_members, bench_world.docs)
        event_tags = tagging.tag_events(
            bench_frames["docs"], list(ev_members.node_phrase), matcher
        ).toPandas()
        doc_tags = assemble_doc_tags(bench_world, concept_tags, event_tags, ao.edges)
        strat, per_tag = run_simulation(
            bench_world, doc_tags, n_users=100, per_user=8
        )
        return strat, per_tag

    strat, per_tag = benchmark.pedantic(run, rounds=1, iterations=1)
    print("\n[bench_table8]\n", strat.to_string(index=False))
    print(per_tag.to_string(index=False))
    base = strat[strat.strategy.str.startswith("baseline")].iloc[0].CTR
    att = strat[strat.strategy.str.startswith("attention")].iloc[0].CTR
    assert att > base
