"""Competitor EA models (lite re-implementations over the same
substrates). Each exposes ``run(spark, kg, **params) -> dict`` with
metrics, wall time, and the analytic memory footprint."""
from repro.baselines.bert_int import run_bert_int
from repro.baselines.gcn_align import run_gcn_align
from repro.baselines.multike import run_multike
from repro.baselines.rdgcn import run_rdgcn
from repro.baselines.rrea import run_rrea

BASELINES = {
    "GCNAlign": run_gcn_align,
    "MultiKE": run_multike,
    "RDGCN": run_rdgcn,
    "RREA": run_rrea,
    "BERT-INT": run_bert_int,
}

__all__ = ["BASELINES"] + [f"run_{n}" for n in ("gcn_align", "multike", "rdgcn", "rrea", "bert_int")]
