"""EA-model substrate: training-free anchor-propagation embeddings
(GCN-Align / RREA stand-ins) and Manhattan top-k similarity."""
