"""Reproduction of "Exact Single-Source SimRank Computation on Large Graphs"
(SIGMOD 2020) — see DESIGN.md for the system map and EXPERIMENTS.md for the
paper-vs-measured tables."""
