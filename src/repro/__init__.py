"""Reproduction of "Comparing Personalized Relevance Algorithms for
Directed Graphs" (Cavalcanti et al., ICDE 2024) — CycleRank and six
baseline relevance algorithms over DataFrame-backed directed graphs,
plus the demo-platform substrate. See DESIGN.md for the map."""
