"""Experiment harness integration: one full query on the smallest dataset."""
import pytest

from repro.bench.harness import dataset_names, prepare_query, run_all_methods
from repro.synth_graph import DATASETS


def test_dataset_names_order_matches_table_x():
    assert dataset_names() == [
        "email-lite",
        "dblp-lite",
        "amazon-lite",
        "youtube-lite",
        "livejournal-lite",
    ]
    assert [DATASETS[n].paper_name for n in dataset_names()] == [
        "email-EU-core",
        "DBLP",
        "Amazon",
        "Youtube",
        "LiveJournal",
    ]


@pytest.mark.slow
def test_end_to_end_all_methods_agree(spark):
    """The exact check every benchmark/job run performs: all four methods
    produce identical SQuery on a real (small) dataset workload."""
    q = prepare_query(
        spark, dataset="email-lite", pattern_nodes=6, m_g=1, n_g=1, m_p=1, n_p=1, seed=1
    )
    assert not q.iquery.isEmpty()
    assert len(q.updates) == 6  # 4 data (1 of each kind) + 2 pattern
    stats = run_all_methods(spark, q)  # raises on SQuery disagreement
    assert set(stats) == {"INC-GPNM", "EH-GPNM", "UA-GPNM-NoPar", "UA-GPNM"}
    assert stats["INC-GPNM"].n_refine_passes == 6
    assert stats["UA-GPNM"].n_slen_passes == 1
    for s in stats.values():
        assert s.total_seconds > 0
