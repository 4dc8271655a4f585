"""State-of-the-art baselines reimplemented from the paper's descriptions
(Section 9.1, Table 9), plus the declarative brute-force oracle used to
validate every approach."""
