"""The paper's evaluation workloads (§6.1) and the timing harness."""
