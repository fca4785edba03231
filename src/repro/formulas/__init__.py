"""Excel-formula substrate: parser, per-row evaluator, execution-guided repair."""
