"""Graph data substrate: seeded generators, the 14 dataset stand-ins
(paper Table 3), and the §3.1 preprocessing pipeline."""
