"""Synthetic cross-lingual KG benchmark substrate.

The paper evaluates on DBpedia-derived benchmarks (IDS15K, IDS100K and
the authors' DBP1M). Those dumps are unavailable offline, so this
package generates deterministic lite-scale equivalents with the same
*properties* the experiments exercise: two heterogeneous KGs over a
shared concept universe, ground-truth 1-to-1 alignment, language-mutated
entity names, power-law degrees, differing relation vocabularies, and
(for dbp1m) asymmetric sizes plus unknown entities. See DESIGN.md.
"""
from repro.kgdata.benchmark import KGPair, make_benchmark, dataset_stats

__all__ = ["KGPair", "make_benchmark", "dataset_stats"]
