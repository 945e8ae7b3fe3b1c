"""Table-level experiment harnesses (one function per paper table).

Each ``run_tableN`` returns ``(rows, markdown)`` where rows are plain
dicts and markdown is the rendered table. ``jobs/tableN.py`` wraps
these for spark-submit; ``benchmarks/bench_tableN.py`` times them.

Scale notes: ``scale`` multiplies the lite dataset sizes (DESIGN.md);
``fast`` shrinks model dims/top-k so unit tests stay quick. Tables are
shape-reproductions — see EXPERIMENTS.md for paper-vs-measured.
"""
import time

from pyspark.sql import SparkSession

from repro.baselines import BASELINES
from repro.core.metis_cps import metis_cps_batches
from repro.core.pipeline import run_largeea
from repro.core.vps import vps_batches
from repro.embedding.propagation import feature_bytes
from repro.eval.memory import mb, sparse_matrix_bytes
from repro.eval.report import format_markdown
from repro.kgdata.benchmark import KGPair, dataset_stats, make_benchmark
from repro.partition.quality import co_location_rate

LANGS = ["en-fr", "en-de"]

_METRIC_COLS = [
    ("method", "Method"),
    ("hits1", "H@1"),
    ("hits5", "H@5"),
    ("mrr", "MRR"),
    ("time_s", "Time (s)"),
    ("mem_mb", "Mem. (MB)"),
]


def _fast_params(fast: bool) -> dict:
    return (
        dict(dim=32, k_top_name=20, n_segments=2, k_top_struct=8)
        if fast
        else dict(dim=64, k_top_name=50, n_segments=4, k_top_struct=10)
    )


def _largeea_rows(
    spark: SparkSession, kg: KGPair, label: str, *, k: int = None, fast: bool = False,
    supervised: bool = True, seed: int = 0,
) -> tuple:
    """Two table rows (EN->L, L->EN) from one LargeEA run."""
    p = _fast_params(fast)
    model = {"G": "gcn", "R": "rrea"}[label]
    res = run_largeea(
        spark, kg, model=model, k=k, supervised=supervised,
        dim=p["dim"], k_top_name=p["k_top_name"], n_segments=p["n_segments"],
        k_top_struct=p["k_top_struct"], seed=seed,
    )
    base = {
        "time_s": round(res.timings["total_s"], 2),
        "mem_mb": mb(res.memory["peak_bytes"]),
    }
    rows = [
        {"method": f"LargeEA-{label} (EN->L)", **{k_: res.metrics_src[k_] for k_ in ("hits1", "hits5", "mrr")}, **base},
        {"method": f"LargeEA-{label} (L->EN)", **{k_: res.metrics_tgt[k_] for k_ in ("hits1", "hits5", "mrr")}, **base},
    ]
    return rows, res


# ---------------------------------------------------------------- Table 1
def run_table1(spark: SparkSession, *, scale: float = 1.0, seed: int = 7) -> tuple:
    """Dataset statistics for all six lite benchmarks (paper Table 1)."""
    rows = []
    for ds in ("ids15k", "ids100k", "dbp1m"):
        for langs in LANGS:
            st = dataset_stats(make_benchmark(spark, ds, langs, scale=scale, seed=seed))
            rows.append(
                {
                    "dataset": ds,
                    "langs": langs,
                    "entities": f"{st['source']['entities']}-{st['target']['entities']}",
                    "relations": f"{st['source']['relations']}-{st['target']['relations']}",
                    "triples": f"{st['source']['triples']}-{st['target']['triples']}",
                    "alignment": st["alignment"],
                }
            )
    cols = [
        ("dataset", "Dataset"), ("langs", "Pair"), ("entities", "#Entities"),
        ("relations", "#Relations"), ("triples", "#Triples"), ("alignment", "#Alignment"),
    ]
    return rows, format_markdown(rows, cols, "Table 1 — dataset statistics (lite)")


# ---------------------------------------------------------------- Table 2
def run_table2(
    spark: SparkSession,
    *,
    datasets: tuple = ("ids15k", "ids100k"),
    langs_list: tuple = tuple(LANGS),
    scale: float = 1.0,
    fast: bool = False,
    seed: int = 7,
) -> tuple:
    """Overall EA on IDS15K/IDS100K: competitors + LargeEA variants."""
    p = _fast_params(fast)
    rows = []
    for ds in datasets:
        for langs in langs_list:
            kg = make_benchmark(spark, ds, langs, scale=scale, seed=seed)
            for name, fn in BASELINES.items():
                t0 = time.perf_counter()
                kwargs = dict(dim=p["dim"], seed=seed)
                if name != "BERT-INT":
                    kwargs["k_top"] = p["k_top_struct"]
                r = fn(spark, kg, **kwargs)
                r["time_s"] = round(time.perf_counter() - t0, 2)
                r["mem_mb"] = mb(r.pop("mem_bytes"))
                rows.append({"dataset": ds, "langs": langs, **r})
            for label in ("G", "R"):
                lrows, _ = _largeea_rows(spark, kg, label, fast=fast, seed=seed)
                for r in lrows:
                    rows.append({"dataset": ds, "langs": langs, **r})
    cols = [("dataset", "Dataset"), ("langs", "Pair")] + _METRIC_COLS
    return rows, format_markdown(rows, cols, "Table 2 — overall EA results (IDS lite)")


# ---------------------------------------------------------------- Table 3
def run_table3(
    spark: SparkSession,
    *,
    langs_list: tuple = tuple(LANGS),
    scale: float = 1.0,
    fast: bool = False,
    seed: int = 7,
) -> tuple:
    """Overall EA on DBP1M (LargeEA only — competitors OOM in the paper)."""
    rows = []
    for langs in langs_list:
        kg = make_benchmark(spark, "dbp1m", langs, scale=scale, seed=seed)
        for label in ("G", "R"):
            lrows, _ = _largeea_rows(spark, kg, label, fast=fast, seed=seed)
            for r in lrows:
                rows.append({"langs": langs, **r})
    cols = [("langs", "Pair")] + _METRIC_COLS
    return rows, format_markdown(rows, cols, "Table 3 — overall EA results (DBP1M lite)")


# ---------------------------------------------------------------- Table 4
def run_table4(
    spark: SparkSession,
    *,
    langs_list: tuple = tuple(LANGS),
    scale: float = 1.0,
    fast: bool = False,
    seed: int = 7,
) -> tuple:
    """Unsupervised EA on DBP1M: pseudo seeds only (Section 3.5)."""
    rows = []
    da_rows = []
    for langs in langs_list:
        kg = make_benchmark(spark, "dbp1m", langs, scale=scale, seed=seed)
        for label in ("G", "R"):
            lrows, res = _largeea_rows(
                spark, kg, label, fast=fast, supervised=False, seed=seed
            )
            for r in lrows:
                rows.append({"langs": langs, **r})
        da_rows.append(
            {
                "langs": langs,
                "n_seeds": res.da_stats.get("n_seeds"),
                "accuracy": res.da_stats.get("accuracy"),
            }
        )
    cols = [("langs", "Pair")] + _METRIC_COLS
    md = format_markdown(rows, cols, "Table 4 — unsupervised EA results (DBP1M lite)")
    md += "\n" + format_markdown(
        da_rows,
        [("langs", "Pair"), ("n_seeds", "#DA seeds"), ("accuracy", "DA accuracy")],
        "Section 3.5 case study — data-augmentation seeds",
    )
    return rows + da_rows, md


# ---------------------------------------------------------------- Table 5
def run_table5(
    spark: SparkSession,
    *,
    datasets: tuple = ("ids15k", "ids100k", "dbp1m"),
    langs_list: tuple = tuple(LANGS),
    scale: float = 1.0,
    seed: int = 7,
) -> tuple:
    """% equivalent entities placed in the same mini-batch (Appendix D).

    Both directions: the reverse direction re-runs the (asymmetric)
    partitioning on the swapped KG pair, as the paper does.
    """
    rows = []
    for ds in datasets:
        for langs in langs_list:
            kg = make_benchmark(spark, ds, langs, scale=scale, seed=seed)
            for direction, pair in (("fwd", kg), ("rev", kg.swapped())):
                k = pair.default_k
                for method, builder in (
                    ("METIS-CPS", lambda: metis_cps_batches(spark, pair, pair.train, k, seed=seed)),
                    ("VPS", lambda: vps_batches(pair, pair.train, k, seed=seed)),
                ):
                    b = builder().localCheckpoint(eager=True)
                    rows.append(
                        {
                            "dataset": ds,
                            "langs": langs,
                            "direction": direction,
                            "method": method,
                            "total": co_location_rate(pair.alignment, b),
                            "train": co_location_rate(pair.train, b),
                            "test": co_location_rate(pair.test, b),
                        }
                    )
    cols = [
        ("dataset", "Dataset"), ("langs", "Pair"), ("direction", "Direction"),
        ("method", "Method"), ("total", "Total"), ("train", "Training set"),
        ("test", "Test set"),
    ]
    return rows, format_markdown(rows, cols, "Table 5 — seed co-location by partitioner")


# ---------------------------------------------------------------- Table 6
def run_table6(
    spark: SparkSession,
    *,
    datasets: tuple = ("ids15k", "ids100k", "dbp1m"),
    langs_list: tuple = tuple(LANGS),
    scale: float = 1.0,
    fast: bool = False,
    seed: int = 7,
) -> tuple:
    """Peak feature-memory of each channel, partitioned vs not (App. E).

    Fully analytic from real batch sizes: the structure channel's peak
    is the largest mini-batch's propagation state (plus RREA's
    quadratic sampling plane); "no partition" uses the whole-KG sizes.
    """
    p = _fast_params(fast)
    dim, layers, k_name = p["dim"], 2, p["k_top_name"]
    rows = []
    for ds in datasets:
        for langs in langs_list:
            kg = make_benchmark(spark, ds, langs, scale=scale, seed=seed)
            n_s, n_t = kg.meta["n_entities"]
            batches = metis_cps_batches(spark, kg, kg.train, kg.default_k, seed=seed)
            sizes = (
                batches.groupBy("batch", "side").count().toPandas()
                .pivot_table(index="batch", columns="side", values="count", fill_value=0)
            )

            def _struct(model: str, ns_nt) -> float:
                quad = (lambda a, b: a * b * 4) if model == "rrea" else (lambda a, b: 0)
                return mb(
                    max(
                        feature_bytes(int(a), dim, layers)
                        + feature_bytes(int(b), dim, layers)
                        + quad(int(a), int(b))
                        for a, b in ns_nt
                    )
                )

            batch_sizes = [(r.get("s", 0), r.get("t", 0)) for _, r in sizes.iterrows()]
            name_mb = mb((n_s + n_t) * dim * 8 + sparse_matrix_bytes(k_name * (n_s + n_t)))
            rows.append(
                {
                    "dataset": ds,
                    "langs": langs,
                    "name_mb": name_mb,
                    "R_part_mb": _struct("rrea", batch_sizes),
                    "R_full_mb": _struct("rrea", [(n_s, n_t)]),
                    "G_part_mb": _struct("gcn", batch_sizes),
                    "G_full_mb": _struct("gcn", [(n_s, n_t)]),
                }
            )
    cols = [
        ("dataset", "Dataset"), ("langs", "Pair"), ("name_mb", "Name Channel (MB)"),
        ("R_part_mb", "LargeEA-R part. (MB)"), ("R_full_mb", "LargeEA-R full (MB)"),
        ("G_part_mb", "LargeEA-G part. (MB)"), ("G_full_mb", "LargeEA-G full (MB)"),
    ]
    return rows, format_markdown(rows, cols, "Table 6 — peak feature memory")
