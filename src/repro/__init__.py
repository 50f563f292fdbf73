"""repro: PySpark reproduction of HypDB — "Bias in OLAP Queries:
Detection, Explanation, and Removal" (Salimi, Gehrke, Suciu; SIGMOD
2018). See DESIGN.md for the architecture and EXPERIMENTS.md for the
paper-vs-measured numbers."""
