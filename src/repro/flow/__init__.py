"""Max-flow / min-st-cut substrate (driver-side, used on localized cores)."""
