"""The paper's contribution: CPI (cumulative power iteration) and TPA
(two-phase approximation), in both distributed (Spark DataFrame) and local
(numpy) forms. The local form doubles as the exact-RWR oracle (Theorem 1:
converged CPI equals the true RWR solution)."""
