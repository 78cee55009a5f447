"""The paper's contribution: VOS (virtual odd sketch) and its estimator."""
