"""The paper's algorithms: counting, baselines, RECEIPT CD/FD, metrics."""
