"""Quality classifier tools (paper Sec. 6.2, Appendix B.1)."""
from repro.quality.classifier import (  # noqa: F401
    QualityClassifier,
    TRAINING_CONFIGS,
    evaluate_classifier,
    keep_label,
    keep_pareto,
)
