"""Query processing on models: views, simple aggregates, time roll-ups, rewriting (paper §VI)."""
