"""T1 (paper Table I): dataset generation at reproduction scale."""
from _tables import save

from repro.experiments.datasets import summary_table


def test_t1_dataset_summary(benchmark):
    table = benchmark.pedantic(summary_table, args=(5000,), rounds=1, iterations=1)
    save("t1_datasets", table)
    assert len(table) == 6
    assert (table["n_interactions"] == 5000).all()
    # LBSN node universes are larger than their interaction-active subsets;
    # relative ordering mirrors Table I: SO pair broadest, Twitter-HK narrow.
    t = table.set_index("dataset")["n_nodes"]
    assert t["stackoverflow-c2a"] > t["twitter-hk"]
