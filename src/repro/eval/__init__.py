"""Quality metrics and experiment harness utilities."""
