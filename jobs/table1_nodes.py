"""Table 1: node counts in the Attention Ontology (+ daily growth).

Paper numbers (web scale): 1,206 categories / 460,652 concepts /
12,679 topics / 86,253 events / 1,980,841 entities; growth ~11,000 new
concepts and ~120 new events per day. Our synthetic world is smaller by
construction; the reproduced *shape* is entities >> concepts > events >
topics > categories, plus a nonzero day-2 growth measured by mining a
second day's click log and counting genuinely new nodes.
"""
from _common import parse_scale, print_table, setup

from repro.core.ontology import build_ontology, mine_attention_nodes
from repro.world import generate_world, to_spark


def main() -> None:
    cfg = parse_scale()
    spark, world, frames, examples, pm, em = setup("table1_nodes", cfg)
    ao = build_ontology(
        spark,
        frames,
        list(world.ontology.entities.phrase),
        list(world.ontology.categories.name),
        pm,
        em,
    )
    print_table("Table 1 — nodes in the attention ontology", ao.node_counts())

    # Day-2 growth: a fresh click log (different seed => new attentions),
    # mined with the same trained models; new nodes = phrases not seen
    # on day 1.
    day2 = generate_world(cfg.scaled(seed=cfg.seed + 101))
    frames2 = to_spark(spark, day2)
    nodes2, _ = mine_attention_nodes(spark, frames2, pm)
    day1_phrases = set(ao.nodes.phrase)
    new_nodes = nodes2[~nodes2.node_phrase.isin(day1_phrases)]
    growth = (
        new_nodes.groupby("kind").size().rename("new_per_day").reset_index()
    )
    print_table("Table 1 (cont.) — growth per simulated day", growth)
    spark.stop()


if __name__ == "__main__":
    main()
