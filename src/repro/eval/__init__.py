"""Evaluation: Hits@N / MRR ranking metrics, the analytic memory model,
and markdown table rendering for the per-table jobs."""
