"""Synthetic image-mask substrate (substitute for WILDS/ImageNet + GradCAM)."""
