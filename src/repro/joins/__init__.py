"""Join query model, dynamic index, RSJoin engine and baselines (Sections 4-5)."""
